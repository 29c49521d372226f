package repro.graphs

import repro.core.GbdaOps

/** An undirected edge between vertex indices `u < v` with a label. */
final case class Edge(u: Int, v: Int, label: String) extends Serializable {
  require(u != v, s"self-loops are not allowed (simple graphs): $u")
}

/** Simple labelled undirected graph (Section 2): vertices are indexed
  * 0..n−1 with labels from `L_V`; at most one labelled edge per pair.
  *
  * Branches (`Def. 2`) are materialized as sorted signature strings
  * `"L(v)|e1,e2,…"` where the incident edge labels are sorted ascending —
  * the "list of strings" storage the paper describes, flattened with
  * separators that never occur in labels. Per Section 3 these accessory
  * structures are considered pre-computed and stored with the graph.
  */
final case class LabeledGraph(id: Long, vertexLabels: Array[String], edges: Array[Edge])
    extends Serializable {
  val n: Int = vertexLabels.length
  def m: Int = edges.length
  def avgDegree: Double = if (n == 0) 0.0 else 2.0 * m / n

  def degrees: Array[Int] = {
    val d = new Array[Int](n)
    edges.foreach { e => d(e.u) += 1; d(e.v) += 1 }
    d
  }

  /** Adjacency as (neighbor, edge label) lists. */
  lazy val adjacency: Array[List[(Int, String)]] = {
    val a = Array.fill(n)(List.empty[(Int, String)])
    edges.foreach { e =>
      a(e.u) ::= (e.v, e.label)
      a(e.v) ::= (e.u, e.label)
    }
    a
  }

  /** Edge label between i and j, if the edge exists. */
  def edgeLabel(i: Int, j: Int): Option[String] = {
    val (a, b) = if (i < j) (i, j) else (j, i)
    edges.collectFirst { case Edge(`a`, `b`, l) => l }
  }

  /** Branch rooted at vertex i, as a signature string (Def. 2). */
  def branchOf(i: Int): String =
    LabeledGraph.branchSig(vertexLabels(i), adjacency(i).map(_._2))

  /** Sorted multiset of all branch signatures B_G (Def. 2). */
  lazy val branches: Array[String] =
    LabeledGraph.branchesOf(vertexLabels, edges)

  /** Multiset of vertex labels (for label-based GED bounds). */
  def vertexLabelMultiset: Seq[String] = vertexLabels.toSeq

  /** Multiset of edge labels. */
  def edgeLabelMultiset: Seq[String] = edges.map(_.label).toSeq
}

object LabeledGraph {

  /** Build one branch signature from a vertex label and incident edge labels. */
  def branchSig(vertexLabel: String, incident: Seq[String]): String =
    vertexLabel + "|" + incident.sorted.mkString(",")

  /** All branch signatures, sorted ascending (the paper's ordered B_G). */
  def branchesOf(vertexLabels: Array[String], edges: Array[Edge]): Array[String] = {
    val n = vertexLabels.length
    val incident = Array.fill(n)(List.empty[String])
    edges.foreach { e =>
      incident(e.u) ::= e.label
      incident(e.v) ::= e.label
    }
    val sigs = Array.tabulate(n)(i => branchSig(vertexLabels(i), incident(i)))
    java.util.Arrays.sort(sigs.asInstanceOf[Array[AnyRef]])
    sigs
  }

  /** GBD(G₁,G₂) = max(|V₁|,|V₂|) − |B₁ ∩ B₂| (Def. 4). */
  def gbd(g1: LabeledGraph, g2: LabeledGraph): Int =
    GbdaOps.gbdFromSortedBranches(g1.branches, g2.branches)

  /** Two branches are isomorphic iff their signatures are equal (Def. 3). */
  def branchIsomorphic(b1: String, b2: String): Boolean = b1 == b2
}
