package repro.spark

import repro.{Oracle, SparkSpec}
import repro.graph.Datasets
import org.apache.spark.sql.functions._

/** The oracle itself must catch wrong results, and the dataset registry
  * must be consistent — meta-level checks.
  */
class OracleSpec extends SparkSpec {

  test("oracle accepts a correct equivalence") {
    import spark.implicits._
    val df = Seq((1, "a"), (2, "b")).toDF("k", "v")
    Oracle.assertEquivalent(
      df.groupBy("v").agg(count(lit(1)).cast("long") as "cnt").select("v", "cnt"),
      "SELECT v, CAST(COUNT(*) AS BIGINT) AS cnt FROM t GROUP BY v",
      "t" -> df)
  }

  test("oracle rejects a wrong result") {
    import spark.implicits._
    val df = Seq((1, "a"), (2, "b")).toDF("k", "v")
    val wrong = df.groupBy("v")
      .agg((count(lit(1)) + 1).cast("long") as "cnt").select("v", "cnt")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong,
        "SELECT v, CAST(COUNT(*) AS BIGINT) AS cnt FROM t GROUP BY v",
        "t" -> df)
    }
  }

  test("oracle rejects mismatched column sets") {
    import spark.implicits._
    val df = Seq((1, "a")).toDF("k", "v")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df.select(col("k") as "wrongname"),
        "SELECT k FROM t", "t" -> df)
    }
  }

  test("dataset registry: byName round-trips, unknown rejected") {
    for (spec <- Datasets.all) assert(Datasets.byName(spec.name) eq spec)
    intercept[RuntimeException] { Datasets.byName("nope") }
    assert(Datasets.all.map(_.name).distinct.size == Datasets.all.size)
    // paper sizes are strictly increasing through the lineup
    val pv = Datasets.all.map(_.paperV)
    assert(pv == pv.sorted)
  }
}
