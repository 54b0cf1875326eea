package repro.exp

import repro.SparkSpec
import repro.core.TestData
import repro.data.InstaData

/** Every workload query must (a) execute exactly on Spark, and (b) be
  * classified by the middleware the way the suite expects: parseable for
  * all, and AQP-rewritable for the `expectAqp` ones (given samples).
  */
class WorkloadsSpec extends SparkSpec {

  private lazy val registered: Unit = {
    TestData.li.createOrReplaceTempView("lineitem")
    TestData.od.createOrReplaceTempView("orders")
    TestData.cu.createOrReplaceTempView("customer")
    TestData.pa.createOrReplaceTempView("part")
    InstaData.orderItems(spark, TestData.SF).cache().createOrReplaceTempView("order_items")
    InstaData.instaOrders(spark, TestData.SF).createOrReplaceTempView("insta_orders")
    InstaData.instaProducts(spark, TestData.SF).createOrReplaceTempView("insta_products")
  }

  test("workload has the expected composition") {
    assert(Workloads.tpch.size == 15)
    assert(Workloads.insta.size == 8)
    assert(Workloads.all.map(_.name).distinct.size == Workloads.all.size)
    assert(Workloads.all.count(!_.expectAqp) == 2) // tq3, tq18
    assert(Workloads.all.exists(_.tags.contains("nested")))
    assert(Workloads.all.exists(_.tags.contains("distinct")))
    assert(Workloads.all.exists(_.tags.contains("quantile")))
  }

  for (q <- Workloads.all) {
    test(s"${q.name}: executes exactly on Spark") {
      registered
      val rows = spark.sql(q.sql).collect()
      assert(rows.nonEmpty, s"${q.name} returned no rows")
    }
  }

  for (q <- Workloads.all) {
    test(s"${q.name}: parses into the middleware AST") {
      registered
      val parsed = TestData.verdictExact.parse(q.sql)
      assert(parsed.isRight,
        s"${q.name}: ${parsed.left.toOption.getOrElse("")}")
    }
  }
}
