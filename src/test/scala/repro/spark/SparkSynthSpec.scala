package repro.spark

import repro.{Oracle, SparkSpec, SynthData}
import org.apache.spark.sql.functions._

/** Exercises the provided TPC-H-lite generators + DuckDB oracle beyond the
  * basic check: joins, filters, and the key generators used for skewed
  * workloads, each verified against DuckDB (shuffle paths included since
  * broadcast joins are disabled in SparkSpec).
  */
class SparkSynthSpec extends SparkSpec {

  test("orders x customer join aggregate matches DuckDB") {
    val o = SynthData.orders(spark, sf = 0.002).cache()
    val c = SynthData.customer(spark, sf = 0.002).cache()
    val agg = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment")
      .agg(count(lit(1)).cast("long") as "cnt",
           round(sum("o_totalprice"), 2) as "total")
      .select("c_mktsegment", "cnt", "total")
    Oracle.assertEquivalent(
      agg,
      """SELECT c_mktsegment, CAST(COUNT(*) AS BIGINT) AS cnt,
        |       ROUND(SUM(CAST(o_totalprice AS DOUBLE)), 2) AS total
        |FROM orders JOIN customer ON o_custkey = c_custkey
        |GROUP BY c_mktsegment""".stripMargin,
      "orders" -> o, "customer" -> c)
    o.unpersist(); c.unpersist()
  }

  test("lineitem filter + group matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.002).cache()
    val q = li.where(col("l_discount") >= 0.05)
      .groupBy("l_linestatus")
      .agg(count(lit(1)).cast("long") as "cnt")
      .select("l_linestatus", "cnt")
    Oracle.assertEquivalent(
      q,
      """SELECT l_linestatus, CAST(COUNT(*) AS BIGINT) AS cnt
        |FROM lineitem WHERE CAST(l_discount AS DOUBLE) >= 0.05
        |GROUP BY l_linestatus""".stripMargin,
      "lineitem" -> li)
    li.unpersist()
  }

  test("part generator: deterministic and within domains") {
    val p1 = SynthData.part(spark, sf = 0.002).collect()
    val p2 = SynthData.part(spark, sf = 0.002).collect()
    assert(p1.map(_.toString).sorted.sameElements(p2.map(_.toString).sorted))
    val types = Set("STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO")
    assert(p1.forall(r => types.contains(r.getString(1))))
  }

  test("zipf keys are more skewed than uniform keys") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 1000)
    val topZ = z.groupBy("k").count().orderBy(desc("count")).limit(1)
      .collect()(0).getLong(1)
    val topU = u.groupBy("k").count().orderBy(desc("count")).limit(1)
      .collect()(0).getLong(1)
    assert(topZ > topU * 3, s"zipf top freq $topZ should dwarf uniform $topU")
  }

  test("uniform keys cover the key space roughly evenly") {
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 50)
    val counts = u.groupBy("k").count().collect().map(_.getLong(1))
    assert(counts.length == 50)
    assert(counts.max < counts.min * 3)
  }
}
