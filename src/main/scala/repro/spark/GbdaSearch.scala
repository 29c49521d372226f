package repro.spark

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.core._
import repro.graphs.LabeledGraph

import scala.util.Random

/** Distributed GBDA (Algorithm 1).
  *
  * Offline stage ([[fitModel]]): sample graph pairs, compute their GBDs
  * distributed ([[GbdSpark.pairwiseGbd]]), fit the GMM prior (Eq. 14–15);
  * tabulate the Jeffreys GED prior `F(τ,v)` (Eq. 16) for every distinct
  * extended size as Spark tasks — mirroring the paper's fully parallel
  * offline processes (Section 7.2).
  *
  * Online stage ([[search]]): the fitted model and the query's branch
  * multiset are broadcast; a UDF computes `φ = GBD(Q,G)` (two-pointer,
  * O(nd)) and `Φ = Σ_{τ≤τ̂} Λ₁·Λ₂` (O(τ̂³)) per row, then filters `Φ ≥ γ`.
  */
object GbdaSearch {

  /** Offline Step 1*: fit both priors from the database DataFrame.
    *
    * @param graphs  branch DataFrame from [[GraphFrames.toBranchDf]]
    * @param nPairs  number of sampled pairs for the GBD prior (α% · |D|²)
    * @param extraVs additional extended sizes to tabulate (e.g. expected
    *                query sizes), besides every distinct |V_G| in the DB
    */
  def fitModel(
      graphs: DataFrame,
      tauHat: Int,
      nPairs: Int,
      gmmK: Int = 3,
      seed: Long = 7,
      extraVs: Seq[Long] = Nil): GbdaModel = {
    val spark = graphs.sparkSession
    val ids = graphs.select("gid", "nv").collect().map(r => (r.getLong(0), r.getInt(1)))
    require(ids.length >= 2, "need at least two graphs to fit priors")

    // Steps 1.1–1.2: sampled pairwise GBDs, computed distributed.
    val rng = new Random(seed)
    val pairs = Seq.fill(nPairs) {
      val i = rng.nextInt(ids.length)
      var j = rng.nextInt(ids.length)
      while (j == i) j = rng.nextInt(ids.length)
      (ids(i)._1, ids(j)._1)
    }
    import spark.implicits._
    val pairsDf = pairs.toDF("gid1", "gid2")
    val gbds = GbdSpark.pairwiseGbd(graphs, pairsDf)
      .select("gbd").collect().map(_.getInt(0).toDouble)

    // Step 1.3–1.4: GMM of the sampled GBDs.
    val gmm = Gmm.fit(gbds, gmmK)

    // Alphabet sizes |L_V|, |L_E| enter D (Eq. 13).
    val nVL = math.max(1L, graphs.select(explode(col("vlabels"))).distinct().count()).toInt
    val nEL = math.max(1L,
      graphs.select(explode(col("edges")).as("e")).select(col("e.label")).distinct().count()).toInt

    // GED prior per distinct extended size, one Spark task per v.
    val vs = (ids.map(_._2.toLong) ++ extraVs).distinct.toSeq
    val priorRows = spark.sparkContext
      .parallelize(vs, math.min(vs.size, spark.sparkContext.defaultParallelism))
      .map(v => (v, JeffreysPrior.forV(v, tauHat, nVL, nEL)))
      .collect()

    GbdaModel(tauHat, nVL, nEL, priorRows.toMap, gmm)
  }

  /** Online stage for one query: returns `(gid, gbd, phi)` rows with
    * `Φ ≥ γ` (Steps 2–4 of Algorithm 1).
    */
  def search(graphs: DataFrame, model: GbdaModel, query: LabeledGraph, gamma: Double): DataFrame =
    scored(graphs, model, query).filter(col("phi") >= gamma)

  /** Online stage without the final γ filter (used by benches that sweep γ). */
  def scored(graphs: DataFrame, model: GbdaModel, query: LabeledGraph): DataFrame = {
    val spark = graphs.sparkSession
    // Cover every extended size v = max(|V_Q|, |V_G|) on the driver so the
    // broadcast table is complete (executors could also compute lazily).
    val nvs = graphs.select("nv").distinct().collect().map(_.getInt(0).toLong)
    val full = model.ensureVs(nvs.map(v => math.max(v, query.n.toLong)).toSeq)
    val bcModel = spark.sparkContext.broadcast(full)
    val qb = query.branches
    val qn = query.n
    val scoreUdf = udf { (branches: Seq[String], nv: Int) =>
      val gbd = GbdaOps.gbdFromSortedBranches(branches.toArray, qb)
      val m = bcModel.value
      (gbd, Gbda.phi(gbd, math.max(nv, qn).toLong, m))
    }
    graphs
      .select(col("gid"), scoreUdf(col("branches"), col("nv")).as("s"))
      .select(col("gid"), col("s._1").as("gbd"), col("s._2").as("phi"))
  }
}
