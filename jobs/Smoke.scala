package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.cluster.Simulator
import repro.harness.{ExperimentContext, Tuners}
import repro.moo.{Baselines, Hmooc}
import repro.params.Configuration
import repro.workload.TpchLite

/** Quick sanity driver: simulator magnitudes, tradeoffs, and one HMOOC
  * solve on a small trained model. Not part of any table; useful when
  * calibrating the cost model.
  */
object Smoke {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master("local[*]").appName("repro-smoke")
      .config("spark.ui.enabled", false)
      .getOrCreate()
    spark.sparkContext.setLogLevel("WARN")

    val sim = new Simulator()
    val queries = TpchLite.queries
    println("=== default config executions (TPC-H) ===")
    queries.foreach { g =>
      val e = sim.runStatic(g, Configuration.default, noiseSeed = 1)
      println(f"${g.name}%-9s subQs=${g.numSubQs}%2d wall=${e.wallSec}%8.1fs ana=${e.analyticalSec}%8.1fs " +
        f"io=${e.ioGb}%7.1fGB cost=$$${e.costUsd}%6.3f algos=${e.joinAlgos.values.groupBy(identity).view.mapValues(_.size).toMap}")
    }

    println("\n=== resource scaling on Q9 ===")
    val q9 = queries(8)
    for (inst <- Seq(2, 6, 12, 24)) {
      val c = Configuration.default
      val conf = c.copy(c = c.c.copy(execInstances = inst))
      val e = sim.runStatic(q9, conf, 1)
      println(f"instances=$inst%2d cores=${conf.c.totalCores}%3d wall=${e.wallSec}%8.1f cost=$$${e.costUsd}%6.3f")
    }

    println("\n=== shuffle partitions sweet spot (Fig 3c shape) ===")
    for (cores <- Seq(8, 32, 128); s5 <- Seq(20, 50, 100, 200, 500, 1000, 2000)) {
      val c = Configuration.default
      val conf = c.copy(
        c = c.c.copy(execCores = 4, execInstances = cores / 4),
        p = c.p.copy(shufflePartitions = s5, advisoryPartitionMb = 16))
      val e = sim.runStatic(queries(2), conf, 1)
      println(f"cores=$cores%3d s5=$s5%4d wall=${e.wallSec}%8.1f")
    }

    println("\n=== broadcast pathology (Fig 3b shape) on Q9 ===")
    for (bcast <- Seq(0, 10, 100, 512)) {
      val c = Configuration.default
      val conf = c.copy(p = c.p.copy(broadcastThresholdMb = bcast))
      val e = sim.runStatic(q9, conf, 1)
      println(f"s4=$bcast%4dMB wall=${e.wallSec}%8.1f algos=${e.joinAlgos}")
    }

    println("\n=== tiny training + HMOOC on Q3 ===")
    sys.props("repro.trainruns_tpch") = "400"
    sys.props("repro.epochs") = "8"
    val ctx = ExperimentContext.forBench(spark, "tpch")
    val g = ctx.queries(2)
    println("model report: " + ctx.report)
    val t0 = System.nanoTime()
    val hm = Hmooc.solve(ctx.qm(g))
    println(f"HMOOC3 front=${hm.front.size} solve=${hm.solveTimeSec}%.2fs (wall ${(System.nanoTime() - t0) / 1e9}%.2fs)")
    hm.front.take(10).foreach(s => println(f"  lat=${s.f1}%8.1f cost=${s.f2}%7.3f"))
    val mows = Baselines.mooWs(ctx.qm(g), nSamples = 2000)
    println(f"MO-WS front=${mows.front.size} solve=${mows.solveTimeSec}%.2fs")
    val fc = hm.recommend((0.9, 0.1)).payload
    val h3 = Tuners.runCompileTime(ctx.sim, g, fc, 1)
    val (h3p, opt) = Tuners.runHybrid(ctx.sim, g, ctx.qm(g), fc, (0.9, 0.1), 1)
    val dflt = Tuners.runDefault(ctx.sim, g, 1)
    println(f"default=${dflt.wallSec}%8.1f  H3=${h3.wallSec}%8.1f  H3+=${h3p.wallSec}%8.1f " +
      f"(lqp=${opt.lqpCalls}, qs=${opt.qsCalls}, optTime=${opt.optTimeSec}%.3fs)")
    spark.stop()
  }
}
