package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.TableRunner

/** spark-submit entrypoint reproducing the paper's Table 1 (Query 1,
  * same-generation over subClassOf/type, all 14 graphs).
  *
  * Usage: spark-submit --class repro.jobs.Table1Job <jar> [dataset ...]
  * With no arguments all 14 datasets run in the paper's order.
  */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("cfpq-table1")
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "16"))
      .getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    try {
      val datasets =
        if (args.isEmpty) repro.data.Datasets.all
        else args.toSeq.map(repro.data.Datasets.byName)
      println(TableRunner.runAndReport(spark, TableRunner.q1, datasets))
    } finally spark.stop()
  }
}
