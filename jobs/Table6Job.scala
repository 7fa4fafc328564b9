package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.bench.Table6Harness

/** spark-submit entrypoint for Table 6 (data transformation comparison). */
object Table6Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("kglids-table6")
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try println(Table6Harness.format(Table6Harness.run(spark)))
    finally spark.stop()
  }
}
