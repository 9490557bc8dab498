package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.harness.Table4Harness

/** spark-submit entrypoint reproducing Table 4 (latency reduction under a
  * strong speed preference). Usage: Table4Job [tpch|tpcds|both]
  */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val benches = args.headOption.getOrElse("both") match {
      case "both" => Seq("tpch", "tpcds")
      case b      => Seq(b)
    }
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("repro-table4")
      .config("spark.ui.enabled", false)
      .getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    benches.foreach { b =>
      val r = Table4Harness.run(spark, b)
      println(Table4Harness.format(r))
      r.perQuery.foreach { q =>
        println(f"  ${q.name}%-10s def=${q.defWall}%7.1f mows=${q.mowsWall}%7.1f(${q.mowsSolve}%5.2fs) " +
          f"h3=${q.h3Wall}%7.1f(${q.h3Solve}%5.2fs) h3+=${q.h3pWall}%7.1f(${q.h3pSolve}%5.2fs)")
      }
    }
    spark.stop()
  }
}
