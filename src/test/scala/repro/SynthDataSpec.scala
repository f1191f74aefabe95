package repro

import org.apache.spark.sql.functions._

/** Smoke coverage for the provided TPC-H-lite generators and the DuckDB
  * oracle on a relational aggregate (this paper's evaluation is on graphs,
  * but the substrate must stay healthy — and this exercises the oracle on
  * the kind of query it was built for).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem is deterministic in (sf, seed) and scales with sf") {
    val a = SynthData.lineitem(spark, sf = 0.001, seed = 7).count()
    val b = SynthData.lineitem(spark, sf = 0.001, seed = 7).count()
    assert(a == b && a == 6000)
  }

  test("orders keys are dense 1..N") {
    val df = SynthData.orders(spark, sf = 0.001)
    val n = df.count()
    assert(n == 1500)
    val mm = df.agg(min("o_orderkey"), max("o_orderkey")).head
    assert(mm.getLong(0) == 1 && mm.getLong(1) == n)
  }

  test("zipf keys are skewed: top key dominates a uniform draw") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val top = z.groupBy("k").count().orderBy(desc("count")).head.getLong(1)
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 1000)
    val topU = u.groupBy("k").count().orderBy(desc("count")).head.getLong(1)
    assert(top > 3 * topU, s"zipf top=$top uniform top=$topU")
  }

  test("oracle validates a grouped aggregate over lineitem against DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    val got = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"), round(sum("l_quantity"), 2).as("qty"))
    Oracle.assertEquivalent(
      got,
      """SELECT l_returnflag,
        |       count(*) AS cnt,
        |       round(sum(CAST(l_quantity AS DOUBLE)), 2) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li,
    )
  }

  test("oracle catches a wrong result (sanity of the oracle itself)") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    val wrong = li.groupBy("l_returnflag")
      .agg((count(lit(1)) + 1).as("cnt")) // off by one
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(
        wrong,
        "SELECT l_returnflag, count(*) AS cnt FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li,
      )
    }
  }
}
