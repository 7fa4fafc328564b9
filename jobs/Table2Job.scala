package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.bench.Table2Harness

/** spark-submit entrypoint for Table 2 (discovery system performance). */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("kglids-table2")
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try println(Table2Harness.format(Table2Harness.run(spark)))
    finally spark.stop()
  }
}
