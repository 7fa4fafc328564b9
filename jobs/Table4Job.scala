package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.bench.Table4Harness

/** spark-submit entrypoint for Table 4 (graph breakdown by aspect). */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val n = args.headOption.map(_.toInt).getOrElse(300)
    val spark = SparkSession.builder.appName("kglids-table4")
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try println(Table4Harness.format(Table4Harness.run(spark, n)))
    finally spark.stop()
  }
}
