package repro.harness

import org.apache.spark.sql.SparkSession

import repro.baselines.{BipartiteGed, GreedyGed, Seriation}
import repro.core.Gbda
import repro.graphs.LabeledGraph
import repro.harness.Datasets.RealSet
import repro.spark.{GbdaSearch, GraphFrames}

/** Effectiveness tables (the paper's Figures 17–25, tabulated): precision
  * ("accuracy" in the paper), recall and F1 of the search results against
  * exact-GED ground truth, per method, τ̂ and probability threshold γ.
  * Counts are aggregated over all queries of a dataset.
  */
object Effectiveness {

  final case class Row(dataset: String, method: String, tauHat: Int, gamma: Option[Double],
                       tp: Int, fp: Int, fn: Int) {
    def precision: Double = if (tp + fp == 0) 1.0 else tp.toDouble / (tp + fp)
    def recall: Double = if (tp + fn == 0) 1.0 else tp.toDouble / (tp + fn)
    def f1: Double = {
      val p = precision; val r = recall
      if (p + r == 0) 0.0 else 2 * p * r / (p + r)
    }
  }

  /** All rows for one dataset. Baseline estimates and exact GEDs are
    * computed once per pair and reused across the τ̂ sweep.
    */
  def rows(spark: SparkSession, set: RealSet,
           tauHats: Seq[Int] = 1 to 5,
           gammas: Seq[Double] = Seq(0.7, 0.8, 0.9),
           nPriorPairs: Int = 2000): Seq[Row] = {
    val gt = GroundTruth.exactGeds(set)
    val pairs = for (q <- set.queries; g <- set.db) yield (q, g)

    val lsap = pairs.map { case (q, g) => (q.id, g.id) -> BipartiteGed.estimateHungarian(q, g) }.toMap
    val greedy = pairs.map { case (q, g) => (q.id, g.id) -> GreedyGed.estimate(q, g) }.toMap
    val serStr = (set.db ++ set.queries).map(g => g.id -> Seriation.seriationString(g)).toMap
    val seriation = pairs.map { case (q, g) =>
      (q.id, g.id) -> Seriation.estimateFromStrings(serStr(q.id), serStr(g.id), q.m, g.m)
    }.toMap

    val graphsDf = GraphFrames.toBranchDf(spark, set.db).cache()
    graphsDf.count()
    val base = GbdaSearch.fitModel(graphsDf, tauHat = tauHats.max, nPairs = nPriorPairs,
      extraVs = set.queries.map(_.n.toLong).distinct)
    graphsDf.unpersist()
    val vs = (set.db.map(_.n.toLong) ++ set.queries.map(_.n.toLong)).distinct
    val allVs = vs.flatMap(v => vs.map(w => math.max(v, w))).distinct

    tauHats.flatMap { th =>
      def metrics(method: String, gamma: Option[Double])(pred: (LabeledGraph, LabeledGraph) => Boolean): Row = {
        var tp = 0; var fp = 0; var fn = 0
        pairs.foreach { case (q, g) =>
          val actual = gt((q.id, g.id)) <= th
          val p = pred(q, g)
          if (p && actual) tp += 1
          else if (p && !actual) fp += 1
          else if (!p && actual) fn += 1
        }
        Row(set.cfg.name, method, th, gamma, tp, fp, fn)
      }

      val model = base.withTauHat(th, allVs)
      val phiCache = pairs.map { case (q, g) =>
        val gbd = repro.core.GbdaOps.gbdFromSortedBranches(q.branches, g.branches)
        (q.id, g.id) -> Gbda.phi(gbd, math.max(q.n, g.n).toLong, model)
      }.toMap

      gammas.map(gm => metrics("GBDA", Some(gm))((q, g) => phiCache((q.id, g.id)) >= gm)) ++ Seq(
        metrics("LSAP", None)((q, g) => lsap((q.id, g.id)) <= th),
        metrics("Greedy-Sort-GED", None)((q, g) => greedy((q.id, g.id)) <= th),
        metrics("Seriation", None)((q, g) => seriation((q.id, g.id)) <= th))
    }
  }

  def render(title: String, rs: Seq[Row]): String =
    TableText.render(
      title,
      Seq("Data Set", "Method", "tauHat", "gamma", "precision", "recall", "F1", "TP", "FP", "FN"),
      rs.map(r => Seq(r.dataset, r.method, r.tauHat.toString,
        r.gamma.map(TableText.fmt(_, 1)).getOrElse("-"),
        TableText.fmt(r.precision), TableText.fmt(r.recall), TableText.fmt(r.f1),
        r.tp.toString, r.fp.toString, r.fn.toString)))
}
