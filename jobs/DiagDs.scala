package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.harness.{ExperimentContext, Tuners}

/** Diagnostic for TPC-DS regressions: default vs HMOOC3 walls per query,
  * with a stage breakdown for the worst offender.
  */
object DiagDs {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.master("local[*]").appName("repro-diagds")
      .config("spark.ui.enabled", false).getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    val ctx = ExperimentContext.forBench(spark, "tpcds")
    val n = args.headOption.map(_.toInt).getOrElse(16)
    val rows = ctx.queries.take(n).map { g =>
      val seed = ctx.noiseSeed(g)
      val d = ctx.defaultExec(g)
      val fc = ctx.hmooc(g).recommend((0.9, 0.1)).payload
      val h3 = Tuners.runCompileTime(ctx.sim, g, fc, seed)
      println(f"${g.name}%-11s m=${g.numSubQs}%2d def=${d.wallSec}%7.1f (ana=${d.analyticalSec}%7.1f) " +
        f"h3=${h3.wallSec}%7.1f cores=${fc.thetaC.totalCores}%3d k3=${fc.thetaC.execInstances}%2d " +
        f"red=${(1 - h3.wallSec / d.wallSec) * 100}%5.0f%%")
      (g, d, h3, fc)
    }
    val worst = rows.minBy { case (_, d, h3, _) => 1 - h3.wallSec / d.wallSec }
    val (g, d, h3, fc) = worst
    println(s"\nWorst: ${g.name} θc=${fc.thetaC}")
    println(s"  θp agg=${repro.runtime.ThetaAggregator.aggregateP(g, fc)}")
    d.stages.foreach(s => println(f"  [def] ${s.subQId}%2d lvl=${s.level}%2d p=${s.partitions}%4d ana=${s.analyticalSec}%7.2f wall=${s.wallShareSec}%7.2f algo=${s.algo} spill=${s.spillFactor}%4.1f"))
    h3.stages.foreach(s => println(f"  [h3 ] ${s.subQId}%2d lvl=${s.level}%2d p=${s.partitions}%4d ana=${s.analyticalSec}%7.2f wall=${s.wallShareSec}%7.2f algo=${s.algo} spill=${s.spillFactor}%4.1f"))
    spark.stop()
  }
}
