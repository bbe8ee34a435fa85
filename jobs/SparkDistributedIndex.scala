package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.graph.Datasets
import repro.exp.Experiments
import repro.spark.{DistributedLabels, LabelQuery, QueryRow}
import scala.util.Random

/** Distributed PSP index build + bulk 2-hop join queries on Spark.
  * Run: spark-submit --class repro.jobs.SparkDistributedIndex <jar> [dataset] [nQueries].
  */
object SparkDistributedIndex {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("repro-distributed-psp")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    import spark.implicits._
    val spec = Datasets.byName(args.headOption.getOrElse("GD-lite"))
    val nQ = if (args.length > 1) args(1).toInt else 20000
    val g = Experiments.graphOf(spec)
    val t0 = System.nanoTime()
    val labels = DistributedLabels.buildLStar(spark, g, spec.k).cache()
    val nLabels = labels.count()
    println(f"built ${nLabels}%,d label rows in ${(System.nanoTime() - t0) / 1e9}%.2f s")
    val rnd = new Random(7)
    val qs = (0 until nQ).map(i => QueryRow(i.toLong, rnd.nextInt(g.n), rnd.nextInt(g.n)))
    val t1 = System.nanoTime()
    val answered = LabelQuery.answer(spark, qs.toDF(), labels).count()
    val dt = (System.nanoTime() - t1) / 1e9
    println(f"answered $answered%,d / $nQ%,d queries in ${dt}%.2f s (${nQ / dt}%,.0f q/s)")
    spark.stop()
  }
}
