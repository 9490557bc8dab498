package repro.harness

import repro.cluster.{QueryExec, Simulator}
import repro.model.QueryModels
import repro.moo.FineConfig
import repro.params.Configuration
import repro.runtime.{RuntimeOptimizer, ThetaAggregator}
import repro.workload.QueryGraph

/** End-to-end execution pipelines: turn a tuner's recommendation into a
  * simulated run, mirroring how each method deploys on real Spark (§6.3).
  */
object Tuners {

  /** A tuned run: what was executed and how long tuning took. */
  final case class Outcome(exec: QueryExec, solveTimeSec: Double)

  /** Stock Spark: default configuration, AQE on, no tuner. */
  def runDefault(sim: Simulator, g: QueryGraph, noiseSeed: Long): QueryExec =
    sim.runStatic(g, Configuration.default, noiseSeed)

  /** Deploy a query-level recommendation (MO-WS, SO-FW, Evo, PF): one
    * configuration at submission, AQE with static parameter copies.
    */
  def runQueryLevel(sim: Simulator, g: QueryGraph, conf: Configuration, noiseSeed: Long): QueryExec =
    sim.runStatic(g, conf, noiseSeed)

  /** Deploy a fine-grained compile-time recommendation without runtime
    * re-optimization (HMOOC3): `θc*` builds the context, the `{θp}`/`{θs}`
    * copies are aggregated into the single submission-time copies (§C.2.1),
    * and plain AQE runs with those static copies.
    */
  def runCompileTime(sim: Simulator, g: QueryGraph, fc: FineConfig, noiseSeed: Long): QueryExec = {
    val pAgg = ThetaAggregator.aggregateP(g, fc)
    val sAgg = ThetaAggregator.aggregateS(g, fc)
    sim.execute(g, fc.thetaC, sim.compilePlan(g, _ => pAgg), pAgg, sAgg, hooks = None, noiseSeed)
  }

  /** Deploy with runtime optimization on top (HMOOC3+): same submission as
    * [[runCompileTime]], plus the AQE-plugin hooks re-tuning `θp`/`θs` from
    * true statistics. Returns the execution and the runtime-optimization
    * overhead (added to the compile-time solving time in Table 4).
    */
  def runHybrid(
      sim: Simulator,
      g: QueryGraph,
      qm: QueryModels,
      fc: FineConfig,
      pref: (Double, Double),
      noiseSeed: Long): (QueryExec, RuntimeOptimizer) = {
    val pAgg = ThetaAggregator.aggregateP(g, fc)
    val sAgg = ThetaAggregator.aggregateS(g, fc)
    val opt = new RuntimeOptimizer(qm, fc.cU, pref, pInit = pAgg)
    val exec = sim.execute(g, fc.thetaC, sim.compilePlan(g, _ => pAgg), pAgg, sAgg, Some(opt), noiseSeed)
    (exec, opt)
  }
}
