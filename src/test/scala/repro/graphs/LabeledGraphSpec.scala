package repro.graphs

import org.scalatest.funsuite.AnyFunSuite

import repro.TestGraphs.{g1, g2, randomSmall}

class LabeledGraphSpec extends AnyFunSuite {

  test("Example 2: branches of G1") {
    assert(g1.branchOf(0) == "A|y,y")
    assert(g1.branchOf(1) == "C|y,z")
    assert(g1.branchOf(2) == "B|y,z")
    assert(g1.branches.toSeq == Seq("A|y,y", "B|y,z", "C|y,z"))
  }

  test("Example 3: branches of G2") {
    assert(g2.branches.toSeq == Seq("A|x", "A|y", "B|x,z", "C|y,z"))
  }

  test("Example 3: GBD(G1, G2) = 3") {
    assert(LabeledGraph.gbd(g1, g2) == 3)
  }

  test("GBD is symmetric and zero on identical graphs") {
    assert(LabeledGraph.gbd(g1, g1) == 0)
    assert(LabeledGraph.gbd(g2, g2) == 0)
    assert(LabeledGraph.gbd(g1, g2) == LabeledGraph.gbd(g2, g1))
  }

  test("branch isomorphism (Def. 3) via signature equality") {
    assert(LabeledGraph.branchIsomorphic("A|x,y", "A|x,y"))
    assert(!LabeledGraph.branchIsomorphic("A|x,y", "A|y,x")) // signatures are canonical-sorted already
    assert(!LabeledGraph.branchIsomorphic("A|x", "B|x"))
  }

  test("branch signature sorts incident labels (canonical form)") {
    assert(LabeledGraph.branchSig("A", Seq("z", "x", "y")) == "A|x,y,z")
    assert(LabeledGraph.branchSig("A", Seq.empty) == "A|")
  }

  test("degrees and average degree") {
    assert(g1.degrees.toSeq == Seq(2, 2, 2))
    assert(g2.degrees.toSeq == Seq(2, 1, 1, 2))
    assert(math.abs(g1.avgDegree - 2.0) < 1e-12)
    assert(math.abs(g2.avgDegree - 1.5) < 1e-12)
  }

  test("edgeLabel lookup works regardless of orientation") {
    assert(g1.edgeLabel(0, 1).contains("y"))
    assert(g1.edgeLabel(1, 0).contains("y"))
    assert(g1.edgeLabel(1, 2).contains("z"))
    assert(g2.edgeLabel(1, 2).isEmpty)
  }

  test("self-loops are rejected") {
    intercept[IllegalArgumentException](Edge(3, 3, "x"))
  }

  test("adjacency is consistent with edges") {
    for (g <- Seq(g1, g2); e <- g.edges) {
      assert(g.adjacency(e.u).exists { case (v, l) => v == e.v && l == e.label })
      assert(g.adjacency(e.v).exists { case (v, l) => v == e.u && l == e.label })
    }
  }

  for (seed <- 1 to 10)
    test(s"GBD upper-bounded by max(|V1|,|V2|) and symmetric (seed=$seed)") {
      val a = randomSmall(seed, 4 + seed % 4)
      val b = randomSmall(seed + 100, 4 + (seed + 1) % 4)
      val d = LabeledGraph.gbd(a, b)
      assert(d >= 0 && d <= math.max(a.n, b.n))
      assert(d == LabeledGraph.gbd(b, a))
    }

  for (seed <- 1 to 10)
    test(s"GBD(g,g)=0 and adding one fresh-labelled edge changes GBD by <= 2 (seed=$seed)") {
      val g = randomSmall(seed + 50, 6)
      assert(LabeledGraph.gbd(g, g) == 0)
      val nonEdges = for {
        i <- 0 until g.n; j <- i + 1 until g.n
        if g.edgeLabel(i, j).isEmpty
      } yield (i, j)
      if (nonEdges.nonEmpty) {
        val (i, j) = nonEdges.head
        val g3 = g.copy(edges = g.edges :+ Edge(i, j, "FRESH"))
        val d = LabeledGraph.gbd(g, g3)
        assert(d >= 1 && d <= 2, s"d=$d") // one AE touches at most two branches
      }
    }

  test("branchesOf on an edgeless graph is the sorted label list") {
    val g = LabeledGraph(9L, Array("C", "A", "B"), Array.empty)
    assert(g.branches.toSeq == Seq("A|", "B|", "C|"))
  }
}
