package repro.spark

import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec}
import repro.TestGraphs.{g1, g2, randomSmall}
import repro.graphs.{GraphGen, LabeledGraph}

class GbdSparkSpec extends SparkSpec {

  private lazy val db: Seq[LabeledGraph] =
    Seq(g2) ++ (1 to 25).map(s => randomSmall(s, 4 + s % 5))
  private lazy val dbDf = GraphFrames.toBranchDf(spark, db).cache()

  test("gbdVsAllJoin (Catalyst path) equals the in-memory GBD for every graph") {
    val got = GbdSpark.gbdVsAllJoin(dbDf, g1).collect()
      .map(r => r.getLong(0) -> r.getInt(1)).toMap
    db.foreach { g =>
      assert(got(g.id) == LabeledGraph.gbd(g1, g), s"gid=${g.id}")
    }
  }

  test("gbdVsAllUdf (two-pointer path) equals the in-memory GBD") {
    val got = GbdSpark.gbdVsAllUdf(dbDf, g1).collect()
      .map(r => r.getLong(0) -> r.getInt(1)).toMap
    db.foreach(g => assert(got(g.id) == LabeledGraph.gbd(g1, g), s"gid=${g.id}"))
  }

  test("the two distributed GBD paths agree with each other") {
    val a = GbdSpark.gbdVsAllJoin(dbDf, g2).collect().map(r => (r.getLong(0), r.getInt(1))).sortBy(_._1)
    val b = GbdSpark.gbdVsAllUdf(dbDf, g2).collect().map(r => (r.getLong(0), r.getInt(1))).sortBy(_._1)
    assert(a.toSeq == b.toSeq)
  }

  test("gbdVsAllJoin result matches DuckDB SQL over the exploded branch tables (Oracle)") {
    val bc = GraphFrames.branchCounts(dbDf)
    val qCounts = g1.branches.groupBy(identity).toSeq.map { case (s, xs) => (s, xs.length) }
    import spark.implicits._
    val qDf = qCounts.toDF("sig", "qcnt")
    val gDf = dbDf.select("gid", "nv")
    val sparkRes = GbdSpark.gbdVsAllJoin(dbDf, g1)
    Oracle.assertEquivalent(
      sparkRes,
      s"""SELECT CAST(g.gid AS BIGINT) AS gid,
         |       CAST(GREATEST(CAST(g.nv AS INT), ${g1.n}) - COALESCE(i.inter, 0) AS INT) AS gbd
         |FROM g LEFT JOIN (
         |  SELECT bc.gid AS gid, SUM(LEAST(CAST(bc.cnt AS INT), CAST(q.qcnt AS INT))) AS inter
         |  FROM bc JOIN q ON bc.sig = q.sig
         |  GROUP BY bc.gid
         |) i ON g.gid = i.gid""".stripMargin,
      "bc" -> bc, "q" -> qDf, "g" -> gDf)
  }

  test("pairwiseGbd matches the in-memory GBD on an explicit pair list") {
    import spark.implicits._
    val pairs = for (i <- db.indices; j <- db.indices if i < j) yield (db(i).id, db(j).id)
    val pairsDf = pairs.toDF("gid1", "gid2")
    val got = GbdSpark.pairwiseGbd(dbDf, pairsDf).collect()
      .map(r => (r.getLong(0), r.getLong(1)) -> r.getInt(2)).toMap
    val byId = db.map(g => g.id -> g).toMap
    pairs.foreach { case (a, b) =>
      assert(got((a, b)) == LabeledGraph.gbd(byId(a), byId(b)), s"pair=($a,$b)")
    }
  }

  test("gbdCross computes the full bulk similarity-join GBD matrix") {
    val queries = Seq(g1, randomSmall(999, 6))
    val qDf = GraphFrames.toBranchDf(spark, queries)
    val got = GbdSpark.gbdCross(dbDf, qDf).collect()
      .map(r => (r.getLong(0), r.getLong(1)) -> r.getInt(2)).toMap
    assert(got.size == queries.size * db.size)
    for (q <- queries; g <- db)
      assert(got((q.id, g.id)) == LabeledGraph.gbd(q, g), s"(${q.id},${g.id})")
  }

  test("distributed GBD on the Appendix-F families reproduces known structure") {
    val ds = GraphGen.synSubset(n = 30, families = 2, d = 4, scaleFree = true, seed = 14)
    val df = GraphFrames.toBranchDf(spark, ds.graphs)
    val q = ds.graphs.head // family 0, variant 0 (the template)
    val got = GbdSpark.gbdVsAllJoin(df, q).collect().map(r => r.getLong(0) -> r.getInt(1)).toMap
    ds.graphs.foreach { g =>
      assert(got(g.id) == LabeledGraph.gbd(q, g))
      // within family 0: variant j differs in j edges around the center, so
      // GBD <= 2j (each RE touches at most two branches)
      if (ds.meta(g.id)._1 == 0) {
        val j = ds.meta(g.id)._2
        assert(got(g.id) <= 2 * j, s"variant $j gbd=${got(g.id)}")
      }
    }
  }
}
