package repro.harness

import repro.graphs.{GraphGen, LabeledGraph}

/** Table 2: statistics of the (reproduction-scale) data sets. */
object Table2Stats {

  final case class Row(name: String, nD: Int, nQ: Int, vMax: Int, eMax: Int,
                       avgDeg: Double, delta: Double, r2: Double, scaleFree: Boolean)

  private def statsOf(name: String, db: Seq[LabeledGraph], nQ: Int): Row = {
    val (delta, r2) = GraphGen.degreeExponent(db)
    // The paper's scale-free criterion: degree fraction ∝ k^−δ, 2<δ<3;
    // we accept a pooled least-squares δ in a slightly tolerant band with a
    // decent fit (small graphs rarely yield clean power laws; see EXPERIMENTS.md).
    val sf = r2 >= 0.75 && delta > 1.8 && delta < 3.2
    Row(name, db.size, nQ, db.map(_.n).max, db.map(_.m).max,
      db.map(_.avgDegree).sum / db.size, delta, r2, sf)
  }

  def rows(): Seq[Row] = {
    val real = Datasets.realSets.map(s => statsOf(s.cfg.name, s.db, s.queries.size))
    val syn = Seq(true, false).map { sf =>
      val subsets = Datasets.synLite(sf)
      val db = subsets.flatMap(_._2.graphs)
      val nQ = subsets.map(s => Datasets.synQueries(s._2).size).sum
      statsOf(if (sf) "Syn-1-lite" else "Syn-2-lite", db, nQ)
    }
    real ++ syn
  }

  def render(rs: Seq[Row]): String =
    TableText.render(
      "Table 2: Statistics of Data Sets (reproduction scale)",
      Seq("Data Set", "|D|", "|Q|", "Vm", "Em", "d", "delta", "R2", "Scale-free"),
      rs.map(r => Seq(r.name, r.nD.toString, r.nQ.toString, r.vMax.toString, r.eMax.toString,
        TableText.fmt(r.avgDeg, 1), TableText.fmt(r.delta, 2), TableText.fmt(r.r2, 2),
        if (r.scaleFree) "Yes" else "No")))
}
