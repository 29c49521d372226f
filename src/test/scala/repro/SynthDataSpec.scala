package repro

import org.apache.spark.sql.functions._

class SynthDataSpec extends SparkSpec {

  test("provided TPC-H-lite stack works end-to-end against the DuckDB oracle") {
    val li = SynthData.lineitem(spark, sf = 0.0005).cache()
    val res = li.groupBy("l_returnflag").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      res,
      "SELECT l_returnflag, COUNT(*) AS cnt FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
    li.unpersist()
  }

  test("graphs() extension produces a valid branch DataFrame") {
    val df = SynthData.graphs(spark, nGraphs = 6, nVertices = 30, seed = 3)
    assert(df.count() == 6)
    assert(df.columns.toSet == Set("gid", "nv", "vlabels", "edges", "branches"))
    df.collect().foreach { r =>
      assert(r.getAs[Int]("nv") == 30)
      val branches = r.getSeq[String](r.fieldIndex("branches"))
      assert(branches.size == 30)
      assert(branches == branches.sorted)
    }
  }

  test("graphs() is deterministic in the seed") {
    val a = SynthData.graphs(spark, 3, 20, seed = 9).select("branches").collect().toSeq
    val b = SynthData.graphs(spark, 3, 20, seed = 9).select("branches").collect().toSeq
    assert(a.map(_.getSeq[String](0)) == b.map(_.getSeq[String](0)))
  }

  test("scale-free flag changes the generated topology") {
    val sf = SynthData.graphs(spark, 2, 200, scaleFree = true, seed = 4)
    val rnd = SynthData.graphs(spark, 2, 200, scaleFree = false, seed = 4)
    val maxDeg = (df: org.apache.spark.sql.DataFrame) =>
      repro.spark.GraphFrames.collectGraphs(df).map(_.degrees.max).max
    assert(maxDeg(sf) > maxDeg(rnd))
  }
}
