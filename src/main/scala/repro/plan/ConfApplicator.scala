package repro.plan

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.params.{ThetaP, ThetaS}

/** Applies a tuned `θp`/`θs` copy to a live `SparkSession` and runs a query
  * under it — the deployment path of the paper's recommendation on real
  * Spark. `θp` and `θs` are all `spark.sql.*` runtime confs, so they can be
  * set per query; `θc` (executor sizing) can only be set at context
  * construction and is therefore exercised in the simulator (see DESIGN.md).
  *
  * `withConf` restores the previous values afterwards, so tests can flip
  * configurations without leaking state into the shared session.
  */
object ConfApplicator {

  /** The conf assignments for one `θp` copy (values in Spark's units). */
  def thetaPConfs(p: ThetaP): Map[String, String] = Map(
    "spark.sql.adaptive.advisoryPartitionSizeInBytes" -> s"${p.advisoryPartitionMb.toLong * 1048576L}",
    "spark.sql.adaptive.nonEmptyPartitionRatioForBroadcastJoin" -> p.nonEmptyPartitionRatio.toString,
    "spark.sql.adaptive.maxShuffledHashJoinLocalMapThreshold" -> s"${p.shuffledHashThresholdMb.toLong * 1048576L}",
    "spark.sql.adaptive.autoBroadcastJoinThreshold" -> s"${p.broadcastThresholdMb.toLong * 1048576L}",
    "spark.sql.autoBroadcastJoinThreshold" -> s"${p.broadcastThresholdMb.toLong * 1048576L}",
    "spark.sql.shuffle.partitions" -> p.shufflePartitions.toString,
    "spark.sql.adaptive.skewJoin.skewedPartitionThresholdInBytes" -> s"${p.skewedPartitionThresholdMb.toLong * 1048576L}",
    "spark.sql.adaptive.skewJoin.skewedPartitionFactor" -> p.skewedPartitionFactor.toString,
    "spark.sql.files.maxPartitionBytes" -> s"${p.maxPartitionBytesMb.toLong * 1048576L}",
    "spark.sql.files.openCostInBytes" -> s"${p.openCostMb.toLong * 1048576L}")

  /** The conf assignments for one `θs` copy. */
  def thetaSConfs(s: ThetaS): Map[String, String] = Map(
    "spark.sql.adaptive.rebalancePartitionsSmallPartitionFactor" -> s.smallPartitionFactor.toString,
    "spark.sql.adaptive.coalescePartitions.minPartitionSize" -> s"${s.minPartitionSizeMb.toLong * 1048576L}")

  /** Run `body` with `confs` applied, restoring the previous values. */
  def withConf[T](spark: SparkSession, confs: Map[String, String])(body: => T): T = {
    val previous = confs.keys.map(k => k -> spark.conf.getOption(k)).toMap
    confs.foreach { case (k, v) => spark.conf.set(k, v) }
    try body
    finally previous.foreach {
      case (k, Some(v)) => spark.conf.set(k, v)
      case (k, None)    => spark.conf.unset(k)
    }
  }

  /** Run `sql` under the tuned copies (AQE enabled) and return the result. */
  def runTuned(spark: SparkSession, sql: String, p: ThetaP, s: ThetaS): DataFrame =
    withConf(spark, thetaPConfs(p) ++ thetaSConfs(s) ++
      Map("spark.sql.adaptive.enabled" -> "true")) {
      val df = spark.sql(sql)
      df.collect() // materialize under the tuned confs (AQE finalizes here)
      df
    }

  /** The physical join operators of a materialized query, by name. */
  def joinOperators(df: DataFrame): Seq[String] = {
    val planString = df.queryExecution.executedPlan.toString
    Seq("BroadcastHashJoin", "ShuffledHashJoin", "SortMergeJoin")
      .filter(planString.contains)
  }
}
