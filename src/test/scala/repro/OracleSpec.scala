package repro

import org.apache.spark.sql.functions._

/** Exercises the provided DuckDB oracle against the provided TPC-H-lite
  * generators — proves the result-equality harness wiring that the index
  * suites rely on, and sanity-checks the generators themselves.
  */
class OracleSpec extends SparkSpec {

  private lazy val li = SynthData.lineitem(spark, sf = 0.001).cache()
  private lazy val ord = SynthData.orders(spark, sf = 0.001).cache()

  test("aggregation over lineitem matches DuckDB") {
    import spark.implicits._
    val agg = li.groupBy($"l_returnflag")
      .agg(count(lit(1)).cast("double") as "cnt",
           sum($"l_quantity") as "sum_qty")
      .select($"l_returnflag", $"cnt", round($"sum_qty", 4) as "sum_qty")
    Oracle.assertEquivalent(
      agg,
      """SELECT l_returnflag,
        |       CAST(COUNT(*) AS DOUBLE) AS cnt,
        |       ROUND(SUM(CAST(l_quantity AS DOUBLE)), 4) AS sum_qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("join lineitem-orders matches DuckDB") {
    import spark.implicits._
    val joined = li.join(ord, li("l_orderkey") === ord("o_orderkey"))
      .groupBy($"o_orderstatus")
      .agg(count(lit(1)).cast("double") as "cnt")
      .select($"o_orderstatus", $"cnt")
    Oracle.assertEquivalent(
      joined,
      """SELECT o_orderstatus, CAST(COUNT(*) AS DOUBLE) AS cnt
        |FROM lineitem JOIN orders ON l_orderkey = o_orderkey
        |GROUP BY o_orderstatus""".stripMargin,
      "lineitem" -> li, "orders" -> ord)
  }

  test("oracle catches a wrong result") {
    import spark.implicits._
    val wrong = li.groupBy($"l_returnflag")
      .agg((count(lit(1)) + 1).cast("double") as "cnt")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        wrong,
        "SELECT l_returnflag, CAST(COUNT(*) AS DOUBLE) AS cnt FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li)
    }
  }

  test("oracle rejects mismatched column sets") {
    import spark.implicits._
    val df = li.select($"l_returnflag").distinct()
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df,
        "SELECT l_returnflag AS other FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li)
    }
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, sf = 0.0005).collect()
    val b = SynthData.lineitem(spark, sf = 0.0005).collect()
    assert(a.toSeq == b.toSeq)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 1000)
    import spark.implicits._
    val zTop = z.groupBy($"k").count().orderBy($"count".desc).limit(1)
      .as[(Long, Long)].collect().head._2
    val uTop = u.groupBy($"k").count().orderBy($"count".desc).limit(1)
      .as[(Long, Long)].collect().head._2
    assert(zTop > uTop * 3, s"zipf top=$zTop uniform top=$uTop")
  }
}
