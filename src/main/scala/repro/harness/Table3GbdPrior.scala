package repro.harness

import org.apache.spark.sql.SparkSession

import repro.core.Gmm
import repro.spark.{GbdSpark, GraphFrames}

import scala.util.Random

/** Table 3: time and space costs of computing the GBD prior distribution
  * (Section 5.2.1 / 6.3.1): sample N graph pairs, compute their GBDs
  * distributed, fit the GMM, tabulate Pr[GBD=φ] for φ ∈ [0, n].
  */
object Table3GbdPrior {

  final case class Row(name: String, nPairs: Int, timeMs: Double, spaceBytes: Long, gmm: Gmm)

  /** Run the full GBD-prior pipeline on one dataset. */
  def run(spark: SparkSession, name: String, db: Seq[repro.graphs.LabeledGraph],
          nPairs: Int, gmmK: Int = 3, seed: Long = 7): Row = {
    val graphsDf = GraphFrames.toBranchDf(spark, db).cache()
    graphsDf.count() // materialize outside the timed region (stored structures)
    import spark.implicits._
    val ids = db.map(_.id).toArray
    val (result, ms) = TableText.timeMs {
      // Step 1.1: sample pairs
      val rng = new Random(seed)
      val pairs = Seq.fill(nPairs) {
        val i = rng.nextInt(ids.length)
        var j = rng.nextInt(ids.length)
        while (j == i) j = rng.nextInt(ids.length)
        (ids(i), ids(j))
      }
      // Step 1.2: distributed pairwise GBDs
      val gbds = GbdSpark.pairwiseGbd(graphsDf, pairs.toDF("gid1", "gid2"))
        .select("gbd").collect().map(_.getInt(0).toDouble)
      // Step 1.3: GMM
      val gmm = Gmm.fit(gbds, gmmK)
      // Step 1.4: tabulate Pr[GBD=φ], φ ∈ [0, n]
      val nMax = db.map(_.n).max
      val table = Array.tabulate(nMax + 1)(phi => gmm.intervalProb(phi.toDouble))
      (gmm, table)
    }
    graphsDf.unpersist()
    Row(name, nPairs, ms, result._2.length * 8L, result._1)
  }

  def rows(spark: SparkSession, nPairsReal: Int = 2000, nPairsSyn: Int = 500): Seq[Row] = {
    val real = Datasets.realSets.map(s => run(spark, s.cfg.name, s.db, nPairsReal))
    val syn = Seq(true, false).map { sf =>
      val db = Datasets.synLite(sf).flatMap(_._2.graphs)
      run(spark, if (sf) "Syn-1-lite" else "Syn-2-lite", db, nPairsSyn)
    }
    real ++ syn
  }

  def render(rs: Seq[Row]): String =
    TableText.render(
      "Table 3: Costs of computing GBD prior distribution",
      Seq("Data Set", "N pairs", "Time", "Space"),
      rs.map(r => Seq(r.name, r.nPairs.toString, TableText.fmtMs(r.timeMs),
        TableText.fmtBytes(r.spaceBytes))))
}
