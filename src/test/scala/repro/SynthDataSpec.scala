package repro

import org.apache.spark.sql.functions._

/** Exercises the provided TPC-H-lite generators and the DuckDB oracle on the
  * shared session (scaffold sanity for this image).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem generator row count scales with sf") {
    assert(SynthData.lineitem(spark, sf = 0.001).count() == 6000L)
  }

  test("orders keys are dense from 1") {
    val o = SynthData.orders(spark, sf = 0.001)
    assert(o.agg(min("o_orderkey"), max("o_orderkey")).head().toSeq == Seq(1L, 1500L))
  }

  test("zipf keys are skewed: the head key dominates a uniform key") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val top = z.groupBy("k").count().orderBy(desc("count")).head().getLong(1)
    assert(top > 20000 / 50, s"top key count=$top") // far above the uniform 20 per key
  }

  test("oracle validates a grouped aggregation over lineitem") {
    val li = SynthData.lineitem(spark, sf = 0.001).select("l_returnflag", "l_quantity")
    val agg = li.groupBy("l_returnflag").agg(
      count(lit(1)).as("cnt"),
      round(sum("l_quantity"), 2).as("qty"),
    )
    Oracle.assertEquivalent(
      agg,
      "SELECT l_returnflag, COUNT(*) AS cnt, ROUND(SUM(CAST(l_quantity AS DOUBLE)), 2) AS qty " +
        "FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li,
    )
  }

  test("oracle catches a wrong result") {
    val li = SynthData.lineitem(spark, sf = 0.001).select("l_returnflag", "l_quantity")
    val wrong = li.groupBy("l_returnflag").agg((count(lit(1)) + 1).as("cnt"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        wrong,
        "SELECT l_returnflag, COUNT(*) AS cnt FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li,
      )
    }
  }
}
