package repro

import org.apache.spark.sql.functions._

/** Scaffolding validation: the provided SynthData generators and the
  * DuckDB oracle work end-to-end on plain SQL results (independent of the
  * hypergraph engines).
  */
class SynthDataOracleSpec extends SparkSpec {

  test("lineitem row count matches DuckDB") {
    import spark.implicits._
    val li = SynthData.lineitem(spark, sf = 0.001)
    Oracle.assertEquivalent(
      Seq(li.count()).toDF("n"),
      "SELECT CAST(count(*) AS BIGINT) AS n FROM lineitem",
      "lineitem" -> li,
    )
  }

  test("group-by aggregate over lineitem matches DuckDB") {
    import spark.implicits._
    val li = SynthData.lineitem(spark, sf = 0.001).cache()
    val agg = li.groupBy("l_returnflag")
      .agg(count(lit(1)) as "cnt", round(sum($"l_quantity"), 2) as "qty")
      .select($"l_returnflag", $"cnt", $"qty")
    Oracle.assertEquivalent(
      agg,
      """SELECT l_returnflag,
        |       CAST(count(*) AS BIGINT) AS cnt,
        |       round(sum(CAST(l_quantity AS DOUBLE)), 2) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li,
    )
  }

  test("orders join customer count matches DuckDB") {
    val o = SynthData.orders(spark, sf = 0.001).cache()
    val c = SynthData.customer(spark, sf = 0.001).cache()
    val joined = o.join(c, o("o_custkey") === c("c_custkey"))
      .agg(count(lit(1)) as "n")
    Oracle.assertEquivalent(
      joined,
      """SELECT CAST(count(*) AS BIGINT) AS n
        |FROM orders o JOIN customer c ON CAST(o.o_custkey AS BIGINT) = CAST(c.c_custkey AS BIGINT)""".stripMargin,
      "orders" -> o, "customer" -> c,
    )
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 1000)
    val zTop = z.groupBy("k").count().orderBy(desc("count")).limit(1).collect()(0).getLong(1)
    val uTop = u.groupBy("k").count().orderBy(desc("count")).limit(1).collect()(0).getLong(1)
    assert(zTop > 3 * uTop, s"zipf top=$zTop uniform top=$uTop")
  }
}
