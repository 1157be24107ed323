package repro.sparkbridge

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.core.FriesPlanner
import repro.data.{Payments, TpcDsLite}

/** The Catalyst bridge: Fries planning over DataFrame logical plans. */
class PlanGraphSpec extends SparkSpec {

  test("a filter/project pipeline maps to a chain of one-to-one operators") {
    val df = Payments.payments(spark, 0.001)
      .where(col("p_amount") > 10)
      .select("p_user", "p_amount")
    val g = PlanGraph.fromDataFrame(df)
    assert(g.dag.vertices.nonEmpty)
    g.nodes.values.foreach { n =>
      assert(!n.meta.oneToMany, s"${n.name} misclassified as one-to-many")
    }
  }

  test("equi-joins are classified one-to-one (PK/FK probe)") {
    val cs = TpcDsLite.catalogSales(spark, 0.001)
    val it = TpcDsLite.item(spark, 0.001)
    val g = PlanGraph.fromDataFrame(cs.join(it, col("cs_item_sk") === col("i_item_sk")))
    val joins = g.nodes.values.filter(_.name.startsWith("Join"))
    assert(joins.nonEmpty)
    joins.foreach(j => assert(!j.meta.oneToMany))
  }

  test("cross joins are classified one-to-many") {
    val a = spark.range(3).toDF("a")
    val b = spark.range(3).toDF("b")
    val g = PlanGraph.fromDataFrame(a.crossJoin(b))
    assert(g.nodes.values.exists(n => n.name.startsWith("Join") && n.meta.oneToMany))
  }

  test("explode (Generate) is classified one-to-many") {
    val df = Payments.paymentsByUser(spark, 0.001).select(explode(col("p_list")))
    val g = PlanGraph.fromDataFrame(df)
    assert(g.nodes.values.exists(n => n.name.startsWith("Generate") && n.meta.oneToMany))
  }

  test("aggregations are classified blocking") {
    val df = Payments.payments(spark, 0.001).groupBy("p_user").count()
    val g = PlanGraph.fromDataFrame(df)
    assert(g.blockingOps.nonEmpty)
  }

  test("edges run in dataflow direction (children feed parents)") {
    val df = Payments.payments(spark, 0.001).where(col("p_amount") > 10)
    val g = PlanGraph.fromDataFrame(df)
    val root = g.dag.sinks
    // The root of the logical plan is the last consumer: a sink of the DAG.
    assert(root.sizeIs == 1)
  }

  test("Fries can plan an MCS over a DataFrame plan graph") {
    val cs = TpcDsLite.catalogSales(spark, 0.001)
    val it = TpcDsLite.item(spark, 0.001)
    val wh = TpcDsLite.warehouse(spark)
    val df = cs.join(it, col("cs_item_sk") === col("i_item_sk"))
      .join(wh, col("cs_warehouse_sk") === col("w_warehouse_sk"))
      .where(col("cs_quantity") > 1)
    val g = PlanGraph.fromDataFrame(df)
    val joins = g.dag.vertices.filter(_.startsWith("Join"))
    assert(joins.size == 2)
    val plan = FriesPlanner.plan(g.dag, joins.toSet, g.meta, pruning = true)
    // Both joins are on one path: a single component containing both.
    assert(plan.components.size == 1)
    assert(joins.forall(plan.components.head.ops))
  }
}
