package repro.workload

/** Logical operator kinds appearing inside a subQ.
  *
  * The paper (§4.3) encodes each operator one-hot by type; this enum is that
  * vocabulary. `Exchange` marks the shuffle boundary a subQ ends with.
  */
sealed abstract class OpType(val id: Int) extends Product with Serializable
object OpType {
  case object Scan      extends OpType(0)
  case object Filter    extends OpType(1)
  case object Project   extends OpType(2)
  case object Join      extends OpType(3)
  case object Aggregate extends OpType(4)
  case object Sort      extends OpType(5)
  case object Exchange  extends OpType(6)
  case object Union     extends OpType(7)

  val all: Vector[OpType] = Vector(Scan, Filter, Project, Join, Aggregate, Sort, Exchange, Union)
  val vocabSize: Int = all.size
}

/** Physical join algorithms the parametric planning rules choose among. */
sealed trait JoinAlgo extends Product with Serializable
object JoinAlgo {
  /** Broadcast hash join — no shuffle, build side replicated to executors. */
  case object BHJ extends JoinAlgo
  /** Shuffled hash join — both sides shuffled, hash build on the smaller. */
  case object SHJ extends JoinAlgo
  /** Sort-merge join — both sides shuffled and sorted. */
  case object SMJ extends JoinAlgo
}

/** One subQ: the group of logical operators that becomes a query stage (QS)
  * when the plan is translated to a physical plan (§4.1).
  *
  * Statistics carry *true* values; the compile-time view multiplies them by
  * `cardErrFactor` (the CBO misestimation, deterministic per operator, with
  * variance growing in join depth — §3.2's Fig 3b pathology).
  *
  * @param id             index within the query (topologically ordered:
  *                       children always have smaller ids)
  * @param ops            operator types inside the stage
  * @param children       upstream subQ ids this stage reads shuffle (or
  *                       broadcast) output from
  * @param baseTable      table name for scan stages
  * @param trueInputBytes true bytes read by the stage (scan bytes, or sum of
  *                       children shuffle-write bytes)
  * @param trueInputRows  true row count read
  * @param trueOutBytes   true bytes this stage writes to its output exchange
  * @param trueOutRows    true rows written
  * @param cardErrFactor  multiplicative CBO error on this stage's output
  *                       cardinality (1.0 = perfect estimate)
  * @param skew           partition-size skew: max/mean ratio of the stage's
  *                       input partition sizes (β in the paper; 1.0 = uniform)
  * @param joinDepth      number of joins beneath (and including) this stage
  */
final case class SubQ(
    id: Int,
    ops: Vector[OpType],
    children: Vector[Int],
    baseTable: Option[String],
    trueInputBytes: Long,
    trueInputRows: Long,
    trueOutBytes: Long,
    trueOutRows: Long,
    cardErrFactor: Double,
    skew: Double,
    joinDepth: Int) {

  def isScan: Boolean = ops.contains(OpType.Scan)
  def isJoin: Boolean = ops.contains(OpType.Join)

  /** CBO-estimated output bytes (compile-time view). */
  def estOutBytes: Long = math.max(1L, (trueOutBytes * cardErrFactor).toLong)

  /** CBO-estimated output rows (compile-time view). */
  def estOutRows: Long = math.max(1L, (trueOutRows * cardErrFactor).toLong)
}

/** A query as a DAG of subQs — the compile-time analogue of the physical
  * plan's DAG of query stages (§4.1). SubQs are stored in topological order.
  */
final case class QueryGraph(name: String, subQs: Vector[SubQ]) {
  require(subQs.nonEmpty, s"$name: empty query graph")
  require(subQs.zipWithIndex.forall { case (s, i) => s.id == i },
    s"$name: subQ ids must equal positions")
  require(subQs.forall(s => s.children.forall(c => c >= 0 && c < s.id)),
    s"$name: children must precede parents (topological order)")

  def numSubQs: Int = subQs.size

  /** SubQs no other subQ reads from (the result-producing stages). */
  def sinks: Vector[SubQ] = {
    val referenced = subQs.flatMap(_.children).toSet
    subQs.filterNot(s => referenced.contains(s.id))
  }

  /** Total true bytes scanned from base tables. */
  def totalScanBytes: Long = subQs.filter(_.isScan).map(_.trueInputBytes).sum
}
