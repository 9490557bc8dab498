package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.harness.Table5Harness

/** spark-submit entrypoint reproducing Table 5 (adapting to preferences).
  * Usage: Table5Job [tpch|tpcds|both]
  */
object Table5Job {
  def main(args: Array[String]): Unit = {
    val benches = args.headOption.getOrElse("both") match {
      case "both" => Seq("tpch", "tpcds")
      case b      => Seq(b)
    }
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("repro-table5")
      .config("spark.ui.enabled", false)
      .getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    benches.foreach(b => println(Table5Harness.format(Table5Harness.run(spark, b))))
    spark.stop()
  }
}
