package repro.ged

import org.scalatest.funsuite.AnyFunSuite

import repro.TestGraphs.{g1, g2, randomSmall}
import repro.graphs.{Edge, LabeledGraph}

class GedBoundsSpec extends AnyFunSuite {

  test("multiset distance basics") {
    import GedBounds.multisetDistance
    assert(multisetDistance(Seq("a", "b"), Seq("a", "b")) == 0)
    assert(multisetDistance(Seq("a", "a"), Seq("a")) == 1)
    assert(multisetDistance(Seq(), Seq("x", "y")) == 2)
    assert(multisetDistance(Seq("a", "b", "b"), Seq("b", "c", "c")) == 2)
  }

  test("lower bound on the running example is <= 3") {
    val lb = GedBounds.labelLowerBound(g1, g2)
    assert(lb <= 3 && lb >= 0, s"lb=$lb")
  }

  for (seed <- 1 to 20)
    test(s"labelLowerBound <= exact GED (seed=$seed)") {
      val a = randomSmall(seed + 500, 3 + seed % 4)
      val b = randomSmall(seed + 600, 3 + (seed + 2) % 4)
      val lb = GedBounds.labelLowerBound(a, b)
      val exact = ExactGed.compute(a, b)
      assert(lb <= exact, s"lb=$lb exact=$exact")
    }

  test("bound is tight for fresh-label edge relabellings (generator soundness)") {
    val g = randomSmall(123, 7, pEdge = 0.7)
    for (k <- 1 to math.min(4, g.m)) {
      val edges = g.edges.clone()
      (0 until k).foreach(i => edges(i) = edges(i).copy(label = s"UNIQ$i"))
      val h = g.copy(edges = edges)
      assert(GedBounds.labelLowerBound(g, h) == k)
      assert(ExactGed.compute(g, h) == k)
    }
  }

  test("bound counts both vertex and edge discrepancies") {
    val a = LabeledGraph(1, Array("A", "B"), Array(Edge(0, 1, "x")))
    val b = LabeledGraph(2, Array("A", "C"), Array(Edge(0, 1, "y")))
    assert(GedBounds.labelLowerBound(a, b) == 2)
    assert(ExactGed.compute(a, b) == 2)
  }

  test("bound handles disjoint vertex alphabets (cross-family certification)") {
    val a = LabeledGraph(1, Array("F0:a", "F0:b", "F0:c"), Array.empty[Edge])
    val b = LabeledGraph(2, Array("F1:a", "F1:b", "F1:c"), Array.empty[Edge])
    assert(GedBounds.labelLowerBound(a, b) == 3)
  }
}
