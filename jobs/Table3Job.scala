package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.bench.Table3Harness

/** spark-submit entrypoint for Table 3 (KG size + analysis time,
  * KGLiDS vs GraphGen4Code). Optional arg: corpus size (default 300).
  */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val n = args.headOption.map(_.toInt).getOrElse(300)
    val spark = SparkSession.builder.appName("kglids-table3")
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try println(Table3Harness.format(Table3Harness.run(spark, n)))
    finally spark.stop()
  }
}
