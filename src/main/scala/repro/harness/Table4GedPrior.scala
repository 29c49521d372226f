package repro.harness

import org.apache.spark.sql.SparkSession

import repro.core.JeffreysPrior

/** Table 4: time and space costs of computing the GED prior distribution
  * (Section 5.2.2 / 6.3.2). `F(τ, v)` is computed for every distinct
  * extended size v of the dataset, one parallel process (Spark task) per v,
  * exactly like the paper's fully-parallelized offline stage: the realized
  * time is maxᵢTᵢ, the single-process time is ΣᵢTᵢ.
  */
object Table4GedPrior {

  final case class Row(name: String, tauHat: Int, nProcesses: Int,
                       sumTimeMs: Double, maxTimeMs: Double,
                       sumSpaceBytes: Long, maxSpaceBytes: Long,
                       wallMs: Double)

  def run(spark: SparkSession, name: String, vs: Seq[Long], tauHat: Int,
          nVertexLabels: Int, nEdgeLabels: Int): Row = {
    val distinct = vs.distinct.sorted
    val (perProcess, wall) = TableText.timeMs {
      spark.sparkContext
        .parallelize(distinct, math.min(distinct.size, spark.sparkContext.defaultParallelism))
        .map { v =>
          val t0 = System.nanoTime()
          val prior = JeffreysPrior.forV(v, tauHat, nVertexLabels, nEdgeLabels)
          val ms = (System.nanoTime() - t0) / 1e6
          (v, ms, prior.length * 8L)
        }
        .collect()
    }
    Row(name, tauHat, perProcess.length,
      perProcess.map(_._2).sum, perProcess.map(_._2).max,
      perProcess.map(_._3).sum, perProcess.map(_._3).max,
      wall)
  }

  def rows(spark: SparkSession, tauHat: Int = 10): Seq[Row] = {
    val real = Datasets.realSets.map { s =>
      run(spark, s.cfg.name, s.db.map(_.n.toLong).distinct, tauHat,
        s.cfg.nVLabels, s.cfg.nELabels)
    }
    val syn = Seq(true, false).map { sf =>
      // one process per subset size, as in the paper's synthetic runs
      run(spark, if (sf) "Syn-1-lite" else "Syn-2-lite",
        Datasets.synSizes.map(_.toLong), tauHat, nVertexLabels = 10, nEdgeLabels = 5)
    }
    real ++ syn
  }

  def render(rs: Seq[Row]): String =
    TableText.render(
      s"Table 4: Costs of computing GED prior distribution (tauHat=${rs.headOption.map(_.tauHat).getOrElse(0)})",
      Seq("Data Set", "#proc", "sum Ti", "max Ti", "sum Si", "max Si", "wall"),
      rs.map(r => Seq(r.name, r.nProcesses.toString,
        TableText.fmtMs(r.sumTimeMs), TableText.fmtMs(r.maxTimeMs),
        TableText.fmtBytes(r.sumSpaceBytes), TableText.fmtBytes(r.maxSpaceBytes),
        TableText.fmtMs(r.wallMs))))
}
