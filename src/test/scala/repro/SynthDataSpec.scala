package repro

import org.apache.spark.sql.functions._

/** The provided TPC-H-lite generators remain part of the toolkit (the graph
  * generators extend them); keep them honest.
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem row count scales with sf") {
    assert(SynthData.lineitem(spark, 0.001).count() == 6000)
    assert(SynthData.lineitem(spark, 0.002).count() == 12000)
  }

  test("lineitem is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, 0.001, seed = 7).agg(sum("l_quantity")).head.getDouble(0)
    val b = SynthData.lineitem(spark, 0.001, seed = 7).agg(sum("l_quantity")).head.getDouble(0)
    assert(a == b)
  }

  test("lineitem value domains") {
    val df = SynthData.lineitem(spark, 0.001).cache()
    assert(df.filter(col("l_quantity") < 1 || col("l_quantity") > 51).count() == 0)
    assert(df.filter(!col("l_returnflag").isin("N", "R", "A")).count() == 0)
    df.unpersist()
  }

  test("orders keys are dense 1..N") {
    val df = SynthData.orders(spark, 0.001)
    val n = df.count()
    assert(df.agg(min("o_orderkey"), max("o_orderkey")).head() match {
      case r => r.getLong(0) == 1L && r.getLong(1) == n
    })
  }

  test("customer aggregation matches DuckDB") {
    val c = SynthData.customer(spark, 0.001)
    Oracle.assertEquivalent(
      c.groupBy("c_mktsegment").agg(count(lit(1)) as "n"),
      "SELECT c_mktsegment, COUNT(*) AS n FROM customer GROUP BY c_mktsegment",
      "customer" -> c)
  }

  test("zipfKeys skews mass onto low ranks") {
    val df = SynthData.zipfKeys(spark, 5000, 100, alpha = 1.2).cache()
    val top = df.filter(col("k") === 1L).count()
    assert(top > 5000 / 100, s"rank-1 count $top not skewed")
    df.unpersist()
  }

  test("uniformKeys covers the key range roughly evenly") {
    val df = SynthData.uniformKeys(spark, 5000, 10).cache()
    val counts = df.groupBy("k").count().collect().map(_.getLong(1))
    assert(counts.length == 10 && counts.min > 300)
    df.unpersist()
  }

  test("graph delegates produce the PropertyGraph edge schema") {
    val e = SynthData.rmatEdges(spark, 6, 40)
    assert(e.columns.toSeq == Seq("src", "dst", "weight"))
  }
}
