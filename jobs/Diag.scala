package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.harness.{ExperimentContext, Tuners}
import repro.runtime.ThetaAggregator

/** Diagnostic: per-query look at what the tuners recommend vs what the
  * simulator then does. Usage: Diag <queryIdx...>
  */
object Diag {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master("local[*]").appName("repro-diag")
      .config("spark.ui.enabled", false).getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    val ctx = ExperimentContext.forBench(spark, "tpch")
    val idxs = if (args.nonEmpty) args.map(_.toInt).toSeq else Seq(6, 17)
    idxs.foreach { qi =>
      val g = ctx.queries(qi)
      val seed = ctx.noiseSeed(g)
      val d = ctx.defaultExec(g)
      println(s"=== ${g.name} (m=${g.numSubQs}) default wall=${d.wallSec}")
      d.stages.foreach(s => println(f"  [def] stage ${s.subQId}%2d lvl=${s.level} p=${s.partitions}%4d " +
        f"ana=${s.analyticalSec}%7.2f algo=${s.algo} spill=${s.spillFactor}%4.1f io=${s.ioMb / 1024}%6.1fGB"))
      val hm = ctx.hmooc(g)
      println(s"  front size=${hm.front.size}")
      hm.front.foreach(s => println(f"   front lat=${s.f1}%8.2f cost=${s.f2}%8.4f c=${s.payload.thetaC}"))
      val rec = hm.recommend((0.9, 0.1))
      val fc = rec.payload
      println(f"  picked pred lat=${rec.f1}%8.2f cost=${rec.f2}%8.4f")
      println(s"  θc*=${fc.thetaC}")
      println(s"  θp agg=${ThetaAggregator.aggregateP(g, fc)}")
      val h3 = Tuners.runCompileTime(ctx.sim, g, fc, seed)
      println(f"  H3 actual wall=${h3.wallSec}%8.2f cost=${h3.costUsd}%8.4f")
      h3.stages.foreach(s => println(f"  [h3] stage ${s.subQId}%2d lvl=${s.level} p=${s.partitions}%4d " +
        f"ana=${s.analyticalSec}%7.2f algo=${s.algo} spill=${s.spillFactor}%4.1f io=${s.ioMb / 1024}%6.1fGB"))
      // predicted vs actual per subQ under the picked config
      val qm = ctx.qm(g)
      g.subQs.indices.foreach { i =>
        val (lat, io) = qm.predictSubQ(i, fc.unit19(i))
        println(f"  [pred] subQ $i%2d lat=$lat%8.3f io=${io / 1024}%6.2fGB")
      }
      // MO-WS pick
      val mows = ctx.mows(g)
      println(s"  MO-WS front size=${mows.front.size}")
      mows.front.foreach(s => println(f"   mows front lat=${s.f1}%8.2f cost=${s.f2}%8.4f"))
      val mrec = mows.recommend((0.9, 0.1)).payload.asQueryLevel
      println(s"  MO-WS conf: c=${mrec.c} p=${mrec.p}")
      val mexec = Tuners.runQueryLevel(ctx.sim, g, mrec, seed)
      println(f"  MO-WS actual wall=${mexec.wallSec}%8.2f cost=${mexec.costUsd}%8.4f algos=${mexec.joinAlgos}")
      g.subQs.filter(_.isJoin).foreach { j =>
        val bld = j.children.map(c => g.subQs(c)).minBy(_.trueOutBytes)
        println(f"  join ${j.id}%2d trueBuild=${bld.trueOutBytes / 1048576.0}%8.1fMB estBuild=${bld.estOutBytes / 1048576.0}%8.1fMB")
      }
    }
    spark.stop()
  }
}
