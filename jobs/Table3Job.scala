package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.harness.Table3Harness

/** spark-submit entrypoint reproducing Table 3 (model performance).
  * Usage: Table3Job [tpch|tpcds|both]
  */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val benches = args.headOption.getOrElse("both") match {
      case "both" => Seq("tpch", "tpcds")
      case b      => Seq(b)
    }
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("repro-table3")
      .config("spark.ui.enabled", false)
      .getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    benches.foreach { b =>
      val rows = Table3Harness.rows(spark, b)
      println(Table3Harness.format(rows))
    }
    spark.stop()
  }
}
