package repro.harness

import repro.ged.ExactGed
import repro.graphs.LabeledGraph
import repro.harness.Datasets.RealSet

/** Exact-GED ground truth for the IAM-like sets, computed once per dataset
  * and memoized (the effectiveness tables sweep τ̂ and γ over the same
  * pairs). Parallelized across the local cores — this is the substitute for
  * the paper's days-long exact-GED runs (DESIGN.md §4).
  */
object GroundTruth {

  private val cache = scala.collection.concurrent.TrieMap.empty[String, Map[(Long, Long), Int]]

  /** (queryId, graphId) → exact GED for every query × database pair. */
  def exactGeds(set: RealSet): Map[(Long, Long), Int] =
    cache.getOrElseUpdate(set.cfg.name, compute(set))

  private def compute(set: RealSet): Map[(Long, Long), Int] = {
    // scala-parallel-collections is not on the classpath; use Java streams.
    val results = new java.util.concurrent.ConcurrentHashMap[(Long, Long), Int]()
    val list = new java.util.ArrayList[(LabeledGraph, LabeledGraph)]()
    for (q <- set.queries; g <- set.db) list.add((q, g))
    list.parallelStream().forEach { t: (LabeledGraph, LabeledGraph) =>
      results.put((t._1.id, t._2.id), ExactGed.compute(t._1, t._2))
    }
    import scala.jdk.CollectionConverters._
    results.asScala.toMap
  }
}
