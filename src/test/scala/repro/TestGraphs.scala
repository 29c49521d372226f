package repro

import repro.graphs.{Edge, LabeledGraph}

/** The running example of the paper (Figure 1), used as ground truth across
  * suites: GED(G1,G2)=3 (Example 1), branch multisets (Examples 2–3),
  * GBD(G1,G2)=3 (Example 3), Λ₁ values (Example 6).
  */
object TestGraphs {

  /** G1: v1(A), v2(C), v3(B); edges v1–v2:y, v1–v3:y, v2–v3:z. */
  val g1: LabeledGraph = LabeledGraph(1L,
    Array("A", "C", "B"),
    Array(Edge(0, 1, "y"), Edge(0, 2, "y"), Edge(1, 2, "z")))

  /** G2: u1(B), u2(A), u3(A), u4(C); edges u1–u3:x, u1–u4:z, u2–u4:y. */
  val g2: LabeledGraph = LabeledGraph(2L,
    Array("B", "A", "A", "C"),
    Array(Edge(0, 2, "x"), Edge(0, 3, "z"), Edge(1, 3, "y")))

  /** Deterministic random small graph for property-style loops. */
  def randomSmall(seed: Long, n: Int, nVL: Int = 3, nEL: Int = 3, pEdge: Double = 0.45): LabeledGraph = {
    val rng = new scala.util.Random(seed)
    val labels = Array.fill(n)(s"L${rng.nextInt(nVL)}")
    val edges = for {
      i <- 0 until n
      j <- i + 1 until n
      if rng.nextDouble() < pEdge
    } yield Edge(i, j, s"e${rng.nextInt(nEL)}")
    // offset ids so fixtures never collide with g1/g2 in mixed databases
    LabeledGraph(100000L + seed, labels, edges.toArray)
  }
}
