package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.TableRunner

/** spark-submit entrypoint reproducing the paper's Table 2 (Query 2,
  * adjacent-layer query over subClassOf, all 14 graphs).
  *
  * Usage: spark-submit --class repro.jobs.Table2Job <jar> [dataset ...]
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("cfpq-table2")
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "16"))
      .getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    try {
      val datasets =
        if (args.isEmpty) repro.data.Datasets.all
        else args.toSeq.map(repro.data.Datasets.byName)
      println(TableRunner.runAndReport(spark, TableRunner.q2, datasets))
    } finally spark.stop()
  }
}
