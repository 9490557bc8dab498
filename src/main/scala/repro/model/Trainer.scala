package repro.model

import org.apache.spark.sql.SparkSession
import scala.collection.mutable
import repro.cluster.ClusterSpec
import repro.workload.{QueryGraph, TraceGen}

/** Trains the subQ / QS / LQP models on simulator traces and reports the
  * Table 3 metrics on a held-out split.
  */
object Trainer {

  /** Metrics of one model target (one Table 3 row). */
  final case class TargetMetrics(latency: Metrics.Report, io: Metrics.Report, xputKps: Double)

  /** Metrics of the three targets of one benchmark. */
  final case class ModelReport(subQ: TargetMetrics, qs: TargetMetrics, lqp: TargetMetrics)

  private final case class Split(
      trainX: Array[Array[Double]], trainY: Array[Array[Double]],
      testX: Array[Array[Double]], testY: Array[Array[Double]])

  private def buildSplit(
      rows: Seq[(Array[Double], Array[Double], Int)]): Split = {
    val train = rows.filter(_._3 <= 7)
    val test  = rows.filter(_._3 == 9)
    Split(
      train.map(_._1).toArray, train.map(_._2).toArray,
      test.map(_._1).toArray, test.map(_._2).toArray)
  }

  private def target(latSec: Double, ioMb: Double): Array[Double] =
    Array(math.log(math.max(1e-5, latSec)), math.log(math.max(1e-5, ioMb)))

  private def evaluate(model: RegModel, s: Split): TargetMetrics = {
    val t0 = System.nanoTime()
    val preds = s.testX.map(model.predictLatIo)
    val elapsed = math.max(1e-9, (System.nanoTime() - t0) / 1e9)
    val latY = s.testY.map(y => math.exp(y(0)))
    val ioY  = s.testY.map(y => math.exp(y(1)))
    TargetMetrics(
      Metrics.report(latY, preds.map(_._1)),
      Metrics.report(ioY, preds.map(_._2)),
      xputKps = s.testX.length / elapsed / 1000.0)
  }

  /** Collect traces, featurize, train the three models, and report metrics.
    *
    * @param nRuns  number of (query, configuration) simulated runs
    * @param epochs Adam epochs per model
    */
  def train(
      spark: SparkSession,
      bench: String,
      nRuns: Int,
      seed: Long = 42L,
      epochs: Int = 25,
      spec: ClusterSpec = ClusterSpec.default): (Models, ModelReport) = {

    val runs = TraceGen.traces(spark, bench, nRuns, seed, spec).collect()
    val embedder = new GraphEmbedder(seed = seed)

    val graphCache = mutable.HashMap.empty[(Int, Long), QueryGraph]
    def graph(t: Int, v: Long): QueryGraph =
      graphCache.getOrElseUpdate((t, v), TraceGen.graphOf(bench, t, v))

    val subQRows = mutable.ArrayBuffer.empty[(Array[Double], Array[Double], Int)]
    val qsRows   = mutable.ArrayBuffer.empty[(Array[Double], Array[Double], Int)]
    val lqpRows  = mutable.ArrayBuffer.empty[(Array[Double], Array[Double], Int)]

    runs.foreach { run =>
      val g = graph(run.template, run.variant)
      val conf = run.conf.toArray
      val bucket = math.abs((run.template * 31L + run.variant * 17L).hashCode) % 10
      val parentOf: Map[Int, Int] = g.subQs.flatMap(s => s.children.map(_ -> s.id)).toMap
      def buildMbOf(id: Int): Double = {
        val s = g.subQs(id)
        if (s.isJoin) s.children.map(c => g.subQs(c).estOutBytes).min / 1048576.0 else 0.0
      }

      run.stageIds.indices.foreach { k =>
        val sub = g.subQs(run.stageIds(k))
        val y = target(run.stageAnalytical(k), run.stageIo(k))

        // subQ model: compile-time view (α_cbo, β=0, γ=0, full θ + hints).
        val (estRows, estBytes) = PlanStats.estIn(g, sub)
        val estBuildMb = buildMbOf(sub.id)
        val estAlgo = Features.ruleAlgoCode(sub.isJoin, estBuildMb, conf)
        val writes = Features.writesShuffle(g, sub.id, parentOf, buildMbOf, conf)
        val subQx = Features.assemble(
          embedder.embedSubQ(sub, estRows, estBytes),
          Features.NonDecision(estBytes / 1048576.0, estRows,
            sub.estOutBytes / 1048576.0, sub.estOutRows.toDouble, 0.0, 0.0, 0.0),
          conf ++ Features.hints(estAlgo, sub.isScan, writes, estBytes / 1048576.0, conf))
        subQRows += ((subQx, y, bucket))

        // QS model: runtime view (true α, β, γ, physical algo; θp dropped).
        val (tRows, tBytes) = PlanStats.trueIn(g, sub)
        val qsX = Features.assemble(
          embedder.embedSubQ(sub, tRows, tBytes),
          Features.NonDecision(tBytes / 1048576.0, tRows,
            sub.trueOutBytes / 1048576.0, sub.trueOutRows.toDouble, sub.skew - 1.0,
            run.stageSiblings(k).toDouble, run.stageSiblingWork(k)),
          Features.dropThetaP(conf) ++
            Features.hints(run.stageAlgo(k), sub.isScan, writes, tBytes / 1048576.0, conf))
        qsRows += ((qsX, y, bucket))
      }

      // LQP model: whole plan with true statistics, end-to-end latency.
      // Mean-pooled embeddings normalize plan size away, so the subQ count
      // rides along as an explicit feature next to the resource hints.
      val sinks = g.sinks
      val lqpX = Features.assemble(
        embedder.embedGraph(g, s => (s.trueInputRows.toDouble, s.trueInputBytes.toDouble)),
        Features.NonDecision(
          g.totalScanBytes / 1048576.0,
          g.subQs.filter(_.isScan).map(_.trueInputRows.toDouble).sum,
          sinks.map(_.trueOutBytes.toDouble).sum / 1048576.0,
          sinks.map(_.trueOutRows.toDouble).sum,
          g.subQs.map(_.skew - 1.0).max, 0.0, 0.0),
        conf ++
          Features.hints(0, isScan = false, writesShuffle = false,
            g.totalScanBytes / 1048576.0, conf) ++
          Array(g.numSubQs / 50.0))
      lqpRows += ((lqpX, target(run.wallSec, run.ioMb), bucket))
    }

    val subQSplit = buildSplit(subQRows.toSeq)
    val qsSplit   = buildSplit(qsRows.toSeq)
    val lqpSplit  = buildSplit(lqpRows.toSeq)

    // Fit on z-scored log targets (RegModel un-scales at prediction time).
    def fit(split: Split, s: Long): RegModel = {
      val n = split.trainY.length
      val mean = Array.tabulate(2)(o => split.trainY.map(_(o)).sum / n)
      val std = Array.tabulate(2) { o =>
        math.max(1e-6, math.sqrt(split.trainY.map(y => {
          val d = y(o) - mean(o); d * d
        }).sum / n))
      }
      val scaled = split.trainY.map(y => Array((y(0) - mean(0)) / std(0), (y(1) - mean(1)) / std(1)))
      val mlp = new Mlp(Array(split.trainX.head.length, 128, 128, 2), s)
      val loss = mlp.train(split.trainX, scaled, epochs, lr = 2e-3)
      Console.err.println(f"[Trainer] $bench model(in=${split.trainX.head.length}, n=${split.trainX.length}) final train MSE=$loss%.4f")
      RegModel(mlp, mean, std)
    }

    val subQMlp = fit(subQSplit, seed + 1)
    val qsMlp   = fit(qsSplit, seed + 2)
    val lqpMlp  = fit(lqpSplit, seed + 3)

    val models = Models(embedder, subQMlp, qsMlp, lqpMlp)
    val report = ModelReport(
      evaluate(subQMlp, subQSplit), evaluate(qsMlp, qsSplit), evaluate(lqpMlp, lqpSplit))
    (models, report)
  }
}
