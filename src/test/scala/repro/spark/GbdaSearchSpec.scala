package repro.spark

import repro.SparkSpec
import repro.TestGraphs.randomSmall
import repro.core.Gbda
import repro.graphs.{GraphGen, LabeledGraph}

class GbdaSearchSpec extends SparkSpec {

  private lazy val db: Seq[LabeledGraph] = {
    // clustered small graphs so similar pairs exist
    val rng = new scala.util.Random(55)
    val vA = IndexedSeq("A", "B", "C")
    val eA = IndexedSeq("x", "y")
    (0 until 8).flatMap { c =>
      val tmpl = GraphGen.randomGraph(c * 10L, 5 + c % 3, 2.0, vA, eA, rng)
      tmpl +: (1 to 3).map(k => GraphGen.perturb(tmpl, k, vA, eA, rng).copy(id = c * 10L + k))
    }
  }
  private lazy val dbDf = GraphFrames.toBranchDf(spark, db).cache()

  private lazy val model = GbdaSearch.fitModel(dbDf, tauHat = 3, nPairs = 300, seed = 5)

  test("fitModel infers alphabet sizes from the dataset") {
    assert(model.nVertexLabels == 3)
    assert(model.nEdgeLabels == 2)
  }

  test("fitModel tabulates a GED prior per distinct graph size") {
    val sizes = db.map(_.n.toLong).distinct.toSet
    assert(sizes.subsetOf(model.gedPrior.keySet))
    model.gedPrior.values.foreach { p =>
      assert(p.length == 4)
      assert(math.abs(p.sum - 1.0) < 1e-9)
    }
  }

  test("fitModel GMM is a sane distribution over observed GBD range") {
    assert(model.gmm.weights.sum > 0.999)
    val mass = (0 to db.map(_.n).max + 2).map(phi => model.gmm.intervalProb(phi.toDouble)).sum
    assert(mass > 0.8, s"mass=$mass") // most mass on the feasible range
  }

  test("distributed search equals the driver-side reference (all gammas)") {
    val q = db(5)
    val ref = Gbda.search(db.map(g => (g.id, g.n, g.branches)), q.n, q.branches, model, gamma = 0.0)
      .map(t => t._1 -> (t._2, t._3)).toMap
    val scoredRows = GbdaSearch.scored(dbDf, model, q).collect()
      .map(r => r.getLong(0) -> (r.getInt(1), r.getDouble(2))).toMap
    assert(scoredRows.keySet == ref.keySet)
    scoredRows.foreach { case (gid, (gbd, phi)) =>
      assert(gbd == ref(gid)._1, s"gid=$gid")
      assert(math.abs(phi - ref(gid)._2) < 1e-9, s"gid=$gid")
    }
    for (gamma <- Seq(0.3, 0.6, 0.9)) {
      val got = GbdaSearch.search(dbDf, model, q, gamma).collect().map(_.getLong(0)).toSet
      val expected = ref.collect { case (gid, (_, phi)) if phi >= gamma => gid }.toSet
      assert(got == expected, s"gamma=$gamma")
    }
  }

  test("phi values are probabilities and the query itself scores highest") {
    val q = db.head
    val rows = GbdaSearch.scored(dbDf, model, q).collect()
      .map(r => (r.getLong(0), r.getInt(1), r.getDouble(2)))
    rows.foreach { case (_, gbd, phi) =>
      assert(phi >= 0.0 && phi <= 1.0)
      assert(gbd >= 0)
    }
    val self = rows.find(_._1 == q.id).get
    assert(self._2 == 0) // GBD to itself
    assert(self._3 == rows.map(_._3).max, "self match must score maximal phi")
  }

  test("a graph identical to the query is found at high gamma") {
    val q = db.head
    val res = GbdaSearch.search(dbDf, model, q, gamma = 0.9).collect().map(_.getLong(0)).toSet
    assert(res.contains(q.id))
  }

  test("searching with a far-away query returns nothing") {
    val far = LabeledGraph(5000L, Array.fill(6)("ZZZ"),
      Array(repro.graphs.Edge(0, 1, "qq"), repro.graphs.Edge(2, 3, "qq")))
    val res = GbdaSearch.search(dbDf, model, far, gamma = 0.5).collect()
    assert(res.isEmpty)
  }

  test("scored covers every database graph exactly once") {
    val q = db(3)
    val rows = GbdaSearch.scored(dbDf, model, q).collect()
    assert(rows.map(_.getLong(0)).sorted.toSeq == db.map(_.id).sorted)
  }
}
