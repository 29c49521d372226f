package repro.core

import org.scalatest.funsuite.AnyFunSuite

class GbdaCoreSpec extends AnyFunSuite {

  private def model(tauHat: Int, vs: Seq[Long]): GbdaModel = {
    val gmm = Gmm.fit(Array(1.0, 2.0, 3.0, 3.0, 4.0, 5.0, 6.0, 8.0), k = 2)
    GbdaModel(tauHat, 3, 3, JeffreysPrior.table(vs, tauHat, 3, 3), gmm)
  }

  test("phi equals the hand-assembled Bayes sum (wiring check)") {
    val m = model(3, Seq(4L))
    val p = ModelParams(4, 3, 3)
    val prior = m.gedPriorForV(4L)
    val prG = m.prGbd(3)
    val expectedRaw = (0 to 3).map(t => BranchModel.lambda1(t, 3, p) * prior(t) / prG).sum
    val expected = math.min(1.0, math.max(0.0, expectedRaw))
    assert(math.abs(Gbda.phi(3, 4L, m) - expected) < 1e-12)
  }

  test("phi memoization is transparent (same value, cache populated)") {
    val m = model(3, Seq(6L))
    val first = Gbda.phi(2, 6L, m)
    assert(m.phiMemo.size == 1)
    assert(Gbda.phi(2, 6L, m) == first)
    assert(m.phiMemo.size == 1)
    // a re-targeted model gets a fresh cache (prior table changed)
    val m2 = m.withTauHat(2, Seq(6L))
    assert(m2.phiMemo.isEmpty)
    val rescored = Gbda.phi(2, 6L, m2)
    assert(rescored >= 0 && rescored <= 1)
  }

  test("phi is clamped to [0, 1]") {
    val m = model(5, Seq(6L))
    for (gbd <- 0 to 20) {
      val p = Gbda.phi(gbd, 6L, m)
      assert(p >= 0.0 && p <= 1.0, s"gbd=$gbd phi=$p")
    }
  }

  test("phi short-circuits to 0 beyond 3*tauHat") {
    val m = model(2, Seq(10L))
    assert(Gbda.phi(7, 10L, m) == 0.0)
    assert(Gbda.phi(100, 10L, m) == 0.0)
  }

  test("phi rejects negative GBD") {
    val m = model(2, Seq(10L))
    intercept[IllegalArgumentException](Gbda.phi(-1, 10L, m))
  }

  test("gedPriorForV computes missing sizes on the fly; ensureVs tabulates them") {
    val m = model(3, Seq(4L))
    val onTheFly = m.gedPriorForV(9L)
    assert(math.abs(onTheFly.sum - 1.0) < 1e-9)
    val m2 = m.ensureVs(Seq(9L, 4L))
    assert(m2.gedPrior.keySet == Set(4L, 9L))
    assert(m2.gedPrior(9L).toSeq == onTheFly.toSeq)
  }

  test("withTauHat retabulates the GED prior at the new threshold") {
    val m = model(5, Seq(4L, 7L)).withTauHat(2, Seq(4L, 7L))
    assert(m.tauHat == 2)
    m.gedPrior.values.foreach { p => assert(p.length == 3 && math.abs(p.sum - 1.0) < 1e-9) }
  }

  test("prGbd respects the floor") {
    val m = model(3, Seq(4L))
    assert(m.prGbd(1000000) >= m.minGbdPrior)
  }

  test("search keeps exactly the graphs with phi >= gamma") {
    val m = model(3, Seq(4L, 5L))
    val b1 = Array("A|x", "B|x", "C|y,z")         // some sorted branch multisets
    val b2 = Array("A|x", "B|x", "B|y", "C|y,z")
    val b3 = Array("Q|q", "R|r", "S|s")
    val q = Array("A|x", "B|x", "C|y,z")
    val db = Seq((1L, 3, b1), (2L, 4, b2), (3L, 3, b3))
    val all = Gbda.search(db, 3, q, m, gamma = 0.0)
    assert(all.map(_._1) == Seq(1L, 2L, 3L))
    // identical multiset -> gbd 0
    assert(all.find(_._1 == 1L).get._2 == 0)
    assert(all.find(_._1 == 2L).get._2 == 1)
    assert(all.find(_._1 == 3L).get._2 == 3)
    for (gamma <- Seq(0.1, 0.5, 0.9)) {
      val res = Gbda.search(db, 3, q, m, gamma)
      val expected = all.filter(_._3 >= gamma).map(_._1)
      assert(res.map(_._1) == expected, s"gamma=$gamma")
    }
  }

  test("phi is monotonically non-increasing in GBD on a typical model") {
    // Not a theorem, but with a smooth prior the posterior for small tauHat
    // should not *increase* as graphs get branch-wise farther apart.
    val m = model(3, Seq(12L))
    val phis = (0 to 9).map(Gbda.phi(_, 12L, m))
    assert(phis.head >= phis.last)
  }

  test("gbdFromSortedBranches: identical, disjoint, partial, different sizes") {
    import GbdaOps.gbdFromSortedBranches
    val a = Array("a", "b", "b", "c")
    assert(gbdFromSortedBranches(a, a) == 0)
    assert(gbdFromSortedBranches(a, Array("x", "y", "z")) == 4)
    assert(gbdFromSortedBranches(a, Array("b", "b", "d")) == 2)
    assert(gbdFromSortedBranches(Array.empty[String], a) == 4)
    assert(gbdFromSortedBranches(a, Array.empty[String]) == 4)
  }

  test("gbdFromSortedBranches respects multiset (not set) semantics") {
    import GbdaOps.gbdFromSortedBranches
    assert(gbdFromSortedBranches(Array("a", "a", "a"), Array("a")) == 2)
    assert(gbdFromSortedBranches(Array("a", "a"), Array("a", "a", "a", "a")) == 2)
  }
}
