package repro.harness

import org.apache.spark.sql.SparkSession

import repro.core.{Gbda, GbdaOps}
import repro.ged.GedBounds
import repro.spark.{GbdaSearch, GraphFrames}

/** Accuracy vs graph size on the Syn sets (the paper's Figures 26–29,
  * tabulated): GBDA precision/recall/F1 against the construction-time
  * ground truth, per graph size n, τ̂ and γ. Cross-family separation is
  * certified once per subset with the label lower bound.
  */
object SynAccuracy {

  final case class Row(dataset: String, n: Int, tauHat: Int, gamma: Double,
                       tp: Int, fp: Int, fn: Int) {
    def precision: Double = if (tp + fp == 0) 1.0 else tp.toDouble / (tp + fp)
    def recall: Double = if (tp + fn == 0) 1.0 else tp.toDouble / (tp + fn)
    def f1: Double = {
      val p = precision; val r = recall
      if (p + r == 0) 0.0 else 2 * p * r / (p + r)
    }
  }

  def rows(spark: SparkSession, scaleFree: Boolean = true,
           sizes: Seq[Int] = Datasets.synSizes,
           tauHats: Seq[Int] = Seq(3, 4, 5, 6),
           gammas: Seq[Double] = Seq(0.7, 0.8, 0.9),
           nPriorPairs: Int = 400): Seq[Row] = {
    val dsName = if (scaleFree) "Syn-1-lite" else "Syn-2-lite"
    sizes.flatMap { n =>
      val ds = Datasets.synSubsetCached(n, scaleFree)
      certifySeparation(ds, tauHats.max)
      val queries = Datasets.synQueries(ds)

      val graphsDf = GraphFrames.toBranchDf(spark, ds.graphs).cache()
      graphsDf.count()
      val base = GbdaSearch.fitModel(graphsDf, tauHat = tauHats.max, nPairs = nPriorPairs)
      graphsDf.unpersist()

      val pairs = for (q <- queries; g <- ds.graphs) yield (q, g)
      val gbdCache = pairs.map { case (q, g) =>
        (q.id, g.id) -> GbdaOps.gbdFromSortedBranches(q.branches, g.branches)
      }.toMap

      tauHats.flatMap { th =>
        val model = base.withTauHat(th, Seq(n.toLong))
        val phiCache = pairs.map { case (q, g) =>
          (q.id, g.id) -> Gbda.phi(gbdCache((q.id, g.id)), n.toLong, model)
        }.toMap
        gammas.map { gm =>
          var tp = 0; var fp = 0; var fn = 0
          pairs.foreach { case (q, g) =>
            val actual = ds.isSimilar(q.id, g.id, th)
            val pred = phiCache((q.id, g.id)) >= gm
            if (pred && actual) tp += 1
            else if (pred && !actual) fp += 1
            else if (!pred && actual) fn += 1
          }
          Row(dsName, n, th, gm, tp, fp, fn)
        }
      }
    }
  }

  /** Certify that graphs of different families are more than τ̂ apart —
    * the construction's cross-family negatives are then exact ground truth.
    */
  def certifySeparation(ds: repro.graphs.GraphGen.KnownGedDataset, tauHatMax: Int): Unit = {
    val reps = ds.meta.groupBy(_._2._1).map { case (_, m) => ds.graphs.find(_.id == m.keys.min).get }
    val rs = reps.toSeq
    for (i <- rs.indices; j <- i + 1 until rs.size) {
      val lb = GedBounds.labelLowerBound(rs(i), rs(j))
      require(lb > tauHatMax,
        s"cross-family lower bound $lb is not > $tauHatMax; ground truth would be unsound")
    }
  }

  def render(rs: Seq[Row]): String =
    TableText.render(
      s"GBDA accuracy vs graph size (Figs. 26–29), ${rs.headOption.map(_.dataset).getOrElse("")}",
      Seq("n", "tauHat", "gamma", "precision", "recall", "F1", "TP", "FP", "FN"),
      rs.map(r => Seq(r.n.toString, r.tauHat.toString, TableText.fmt(r.gamma, 1),
        TableText.fmt(r.precision), TableText.fmt(r.recall), TableText.fmt(r.f1),
        r.tp.toString, r.fp.toString, r.fn.toString)))
}
