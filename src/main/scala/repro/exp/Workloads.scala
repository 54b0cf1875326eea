package repro.exp

/** The benchmark query suite (Section 6.1): TPC-H queries restated on the
  * TPC-H-lite schema (lineitem/orders/customer/part — no supplier/nation/
  * region in the lite schema, so joins/filters are restated while keeping
  * each query's aggregate-join-filter-group structure), plus insta-style
  * micro-benchmark queries on the instacart-lite schema.
  *
  * `expectAqp = false` marks the queries the paper reports as infeasible
  * for AQP (tq-3, tq-8, tq-15 there) because of high-cardinality grouping:
  * our tq3/tq18 group by order key and must be declined by the planner.
  */
object Workloads {

  final case class WorkQuery(name: String, sql: String, expectAqp: Boolean = true,
                             tags: Set[String] = Set.empty)

  /** TPC-H-lite queries. */
  val tpch: Seq[WorkQuery] = Seq(
    WorkQuery("tq1",
      """SELECT l_returnflag, l_linestatus,
        |  sum(l_quantity) AS sum_qty,
        |  sum(l_extendedprice) AS sum_base_price,
        |  sum(l_extendedprice * (1 - l_discount)) AS sum_disc_price,
        |  avg(l_quantity) AS avg_qty,
        |  avg(l_extendedprice) AS avg_price,
        |  avg(l_discount) AS avg_disc,
        |  count(*) AS count_order
        |FROM lineitem
        |WHERE l_shipdate <= '1998-09-01'
        |GROUP BY l_returnflag, l_linestatus
        |ORDER BY l_returnflag, l_linestatus""".stripMargin,
      tags = Set("flat")),
    WorkQuery("tq3",
      """SELECT l_orderkey, sum(l_extendedprice * (1 - l_discount)) AS revenue
        |FROM lineitem, orders
        |WHERE l_orderkey = o_orderkey AND o_orderdate < '1995-03-15'
        |GROUP BY l_orderkey
        |ORDER BY revenue DESC LIMIT 10""".stripMargin,
      expectAqp = false, tags = Set("join", "highcard")),
    WorkQuery("tq4",
      """SELECT o_orderstatus, count(*) AS order_count
        |FROM orders
        |WHERE o_orderdate >= '1993-07-01' AND o_orderdate < '1994-10-01'
        |GROUP BY o_orderstatus""".stripMargin,
      tags = Set("flat")),
    WorkQuery("tq5",
      """SELECT c_nationkey, sum(l_extendedprice * (1 - l_discount)) AS revenue
        |FROM lineitem, orders, customer
        |WHERE l_orderkey = o_orderkey AND o_custkey = c_custkey
        |GROUP BY c_nationkey
        |ORDER BY revenue DESC""".stripMargin,
      tags = Set("join", "samplejoin")),
    WorkQuery("tq6",
      """SELECT sum(l_extendedprice * l_discount) AS revenue
        |FROM lineitem
        |WHERE l_shipdate >= '1994-01-01' AND l_shipdate < '1995-01-01'
        |  AND l_discount >= 0.05 AND l_discount <= 0.07 AND l_quantity < 24""".stripMargin,
      tags = Set("flat")),
    WorkQuery("tq7",
      """SELECT l_linestatus, o_orderstatus, sum(l_extendedprice) AS revenue
        |FROM lineitem, orders
        |WHERE l_orderkey = o_orderkey
        |GROUP BY l_linestatus, o_orderstatus""".stripMargin,
      tags = Set("join", "samplejoin")),
    WorkQuery("tq10",
      """SELECT c_mktsegment, sum(l_extendedprice * (1 - l_discount)) AS revenue,
        |  count(*) AS cnt
        |FROM lineitem, orders, customer
        |WHERE l_orderkey = o_orderkey AND o_custkey = c_custkey
        |  AND l_returnflag = 'R'
        |GROUP BY c_mktsegment""".stripMargin,
      tags = Set("join", "samplejoin")),
    WorkQuery("tq12",
      """SELECT l_linestatus, count(*) AS cnt
        |FROM lineitem, orders
        |WHERE l_orderkey = o_orderkey AND o_orderdate >= '1994-01-01'
        |GROUP BY l_linestatus""".stripMargin,
      tags = Set("join", "samplejoin")),
    WorkQuery("tq14",
      """SELECT (100.0 * sum(CASE WHEN p_type = 'PROMO'
        |    THEN l_extendedprice * (1 - l_discount) ELSE 0.0 END)
        |  / sum(l_extendedprice * (1 - l_discount))) AS promo_revenue
        |FROM lineitem, part
        |WHERE l_partkey = p_partkey
        |  AND l_shipdate >= '1995-09-01' AND l_shipdate < '1995-12-01'""".stripMargin,
      tags = Set("join")),
    WorkQuery("tq17",
      """SELECT avg(l_extendedprice) AS avg_yearly
        |FROM lineitem, part
        |WHERE l_partkey = p_partkey AND p_size < 10 AND l_quantity < 5""".stripMargin,
      tags = Set("join")),
    WorkQuery("tq18",
      """SELECT o_orderkey, sum(l_quantity) AS sum_qty
        |FROM lineitem, orders
        |WHERE l_orderkey = o_orderkey
        |GROUP BY o_orderkey
        |ORDER BY sum_qty DESC LIMIT 10""".stripMargin,
      expectAqp = false, tags = Set("join", "highcard")),
    WorkQuery("tq19",
      """SELECT sum(l_extendedprice * (1 - l_discount)) AS revenue
        |FROM lineitem, part
        |WHERE l_partkey = p_partkey AND p_size >= 1 AND p_size <= 15
        |  AND l_quantity >= 10 AND l_quantity <= 30""".stripMargin,
      tags = Set("join")),
    WorkQuery("tq20",
      """SELECT count(distinct l_orderkey) AS supplier_cnt
        |FROM lineitem
        |WHERE l_shipdate >= '1997-01-01'""".stripMargin,
      tags = Set("flat", "distinct")),
    WorkQuery("tq-median",
      "SELECT percentile(l_extendedprice, 0.5) AS med FROM lineitem",
      tags = Set("flat", "quantile")),
    WorkQuery("tq-nested",
      """SELECT avg(daily) AS avg_daily
        |FROM (SELECT l_linenumber, sum(l_extendedprice) AS daily
        |      FROM lineitem GROUP BY l_linenumber) t""".stripMargin,
      tags = Set("nested")),
  )

  /** instacart-lite micro-benchmark queries. */
  val insta: Seq[WorkQuery] = Seq(
    WorkQuery("iq1",
      """SELECT io_dow, count(*) AS cnt
        |FROM order_items, insta_orders
        |WHERE oi_order_id = io_order_id
        |GROUP BY io_dow""".stripMargin,
      tags = Set("join", "samplejoin")),
    WorkQuery("iq2",
      """SELECT ip_department_id, sum(oi_price) AS revenue
        |FROM order_items, insta_products
        |WHERE oi_product_id = ip_product_id
        |GROUP BY ip_department_id""".stripMargin,
      tags = Set("join")),
    WorkQuery("iq3",
      "SELECT avg(oi_quantity) AS avg_qty FROM order_items",
      tags = Set("flat")),
    WorkQuery("iq4",
      """SELECT io_hour, avg(oi_price) AS avg_price
        |FROM order_items, insta_orders
        |WHERE oi_order_id = io_order_id
        |GROUP BY io_hour""".stripMargin,
      tags = Set("join", "samplejoin")),
    WorkQuery("iq5",
      "SELECT count(distinct oi_order_id) AS cd FROM order_items",
      tags = Set("flat", "distinct")),
    WorkQuery("iq6",
      """SELECT io_dow, ip_department_id, sum(oi_price * oi_quantity) AS revenue
        |FROM order_items, insta_orders, insta_products
        |WHERE oi_order_id = io_order_id AND oi_product_id = ip_product_id
        |GROUP BY io_dow, ip_department_id""".stripMargin,
      tags = Set("join", "samplejoin")),
    WorkQuery("iq7",
      """SELECT oi_reordered, count(*) AS cnt, avg(oi_price) AS avg_price
        |FROM order_items GROUP BY oi_reordered""".stripMargin,
      tags = Set("flat")),
    WorkQuery("iq8",
      "SELECT sum(oi_price) AS revenue FROM order_items WHERE oi_quantity >= 3",
      tags = Set("flat")),
  )

  val all: Seq[WorkQuery] = tpch ++ insta
}
