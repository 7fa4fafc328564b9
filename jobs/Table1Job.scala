package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.bench.Table1Harness

/** spark-submit entrypoint for Table 1 (benchmark statistics).
  *
  * {{{ spark-submit --class repro.jobs.Table1Job repro.jar }}}
  */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("kglids-table1")
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try println(Table1Harness.format(Table1Harness.run(spark)))
    finally spark.stop()
  }
}
