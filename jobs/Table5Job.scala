package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.bench.Table5Harness

/** spark-submit entrypoint for Table 5 (data cleaning comparison). */
object Table5Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("kglids-table5")
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try println(Table5Harness.format(Table5Harness.run(spark)))
    finally spark.stop()
  }
}
