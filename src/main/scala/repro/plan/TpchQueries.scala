package repro.plan

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.SynthData

/** Real Spark SQL queries in the style of TPC-H over the `SynthData`
  * tables. These run on actual Spark 4.1 (Catalyst + AQE): the plan
  * extractor maps their optimized plans to our subQ DAG abstraction, the
  * DuckDB oracle checks result equality under tuned configurations, and the
  * plan-flip tests verify that the `θp` parameters really steer join
  * strategies in Catalyst.
  */
object TpchQueries {

  /** A query: name, SQL text, and the tables it reads. */
  final case class Q(name: String, sql: String, tables: Vector[String])

  /** Register the TPC-H-lite tables as temp views and return them. */
  def registerTables(spark: SparkSession, sf: Double = 0.005): Map[String, DataFrame] = {
    val tables = Map(
      "lineitem" -> SynthData.lineitem(spark, sf),
      "orders"   -> SynthData.orders(spark, sf),
      "customer" -> SynthData.customer(spark, sf),
      "part"     -> SynthData.part(spark, sf),
      "supplier" -> SynthData.supplier(spark, sf),
      "nation"   -> SynthData.nation(spark))
    tables.foreach { case (n, df) => df.createOrReplaceTempView(n) }
    tables
  }

  /** Q1-style: single-table scan + aggregate. */
  val q1: Q = Q("q1",
    """SELECT l_returnflag, l_linestatus,
      |       round(sum(l_quantity), 2) AS sum_qty,
      |       round(sum(l_extendedprice), 2) AS sum_base_price,
      |       count(*) AS count_order
      |FROM lineitem
      |WHERE l_shipdate <= date '1998-09-01'
      |GROUP BY l_returnflag, l_linestatus""".stripMargin,
    Vector("lineitem"))

  /** Q3-style: customer ⋈ orders ⋈ lineitem + aggregate (Fig 1(b)). */
  val q3: Q = Q("q3",
    """SELECT o_orderkey AS l_orderkey,
      |       round(sum(l_extendedprice * (1 - l_discount)), 2) AS revenue,
      |       o_orderdate
      |FROM customer, orders, lineitem
      |WHERE c_mktsegment = 'BUILDING' AND c_custkey = o_custkey
      |  AND l_orderkey = o_orderkey AND o_orderdate < date '1995-03-15'
      |GROUP BY o_orderkey, o_orderdate""".stripMargin,
    Vector("customer", "orders", "lineitem"))

  /** Q5-style: five-way join with a tiny broadcastable dimension. */
  val q5: Q = Q("q5",
    """SELECT n_name, round(sum(l_extendedprice * (1 - l_discount)), 2) AS revenue
      |FROM customer, orders, lineitem, supplier, nation
      |WHERE c_custkey = o_custkey AND l_orderkey = o_orderkey
      |  AND l_partkey % 10000 + 1 = s_suppkey
      |  AND c_nationkey = s_nationkey AND s_nationkey = n_nationkey
      |GROUP BY n_name""".stripMargin,
    Vector("customer", "orders", "lineitem", "supplier", "nation"))

  /** Q6-style: single-table filter + global aggregate. */
  val q6: Q = Q("q6",
    """SELECT round(sum(l_extendedprice * l_discount), 2) AS revenue
      |FROM lineitem
      |WHERE l_shipdate >= date '1994-01-01' AND l_shipdate < date '1995-01-01'
      |  AND l_discount BETWEEN 0.02 AND 0.06 AND l_quantity < 24""".stripMargin,
    Vector("lineitem"))

  /** Q12-style: orders ⋈ lineitem + grouped counts. */
  val q12: Q = Q("q12",
    """SELECT l_returnflag, count(*) AS line_count
      |FROM orders, lineitem
      |WHERE o_orderkey = l_orderkey AND l_shipdate < date '1995-01-01'
      |GROUP BY l_returnflag""".stripMargin,
    Vector("orders", "lineitem"))

  /** Q14-style: lineitem ⋈ part with conditional aggregate. */
  val q14: Q = Q("q14",
    """SELECT round(sum(CASE WHEN p_type = 'PROMO' THEN l_extendedprice ELSE 0.0 END), 2) AS promo_revenue,
      |       count(*) AS total_lines
      |FROM lineitem, part
      |WHERE l_partkey = p_partkey AND l_shipdate >= date '1995-09-01'""".stripMargin,
    Vector("lineitem", "part"))

  /** Q18-style: aggregate over a 3-way join with HAVING-like filter. */
  val q18: Q = Q("q18",
    """SELECT c_custkey, o_orderkey, round(sum(l_quantity), 2) AS total_qty
      |FROM customer, orders, lineitem
      |WHERE c_custkey = o_custkey AND o_orderkey = l_orderkey
      |  AND o_totalprice > 400000
      |GROUP BY c_custkey, o_orderkey""".stripMargin,
    Vector("customer", "orders", "lineitem"))

  /** Q19-style: join with disjunctive predicates. */
  val q19: Q = Q("q19",
    """SELECT round(sum(l_extendedprice * (1 - l_discount)), 2) AS revenue
      |FROM lineitem, part
      |WHERE l_partkey = p_partkey
      |  AND ((p_size <= 15 AND l_quantity >= 10) OR (p_size > 35 AND l_quantity < 10))""".stripMargin,
    Vector("lineitem", "part"))

  val all: Vector[Q] = Vector(q1, q3, q5, q6, q12, q14, q18, q19)
}
