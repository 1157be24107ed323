package repro.workflows

import repro.{Oracle, SparkSpec}
import repro.data.{Rows, TpcDsLite}
import repro.dataflow.Engine
import repro.sched.FriesScheduler

/** W2 (TPC-DS query 40 probe side): three-way equivalence — the dataflow
  * engine's output, the Spark DataFrame reference, and the DuckDB oracle —
  * plus the structural MCS expectations of Table 4.
  */
class W2Spec extends SparkSpec {

  private val sf = 0.02
  private val prm = W2.Params(p = 1, priceLo = 0.99, priceHi = 1.49,
    dateLoSk = 800, dateWindowDays = 600)
  private lazy val in = W2.inputs(spark, sf)

  private def runEngine(p: Int): Vector[Map[String, Any]] = {
    val engine = new Engine(W2.dataflow(in, prm.copy(p = p)))
    engine.start()
    engine.awaitCompletion(120_000)
    engine.collected("SINK").map(_.values)
  }

  test("engine output matches the Spark DataFrame reference (p=1)") {
    val engineRows = runEngine(1)
    assert(engineRows.nonEmpty, "empty result — filters too tight for this sf")
    Rows.assertSameRows(engineRows, Rows.toMaps(W2.sparkReference(spark, sf, prm)),
      W2.outputCols, "W2 engine vs Spark")
  }

  test("engine output is identical under parallelism (p=3)") {
    Rows.assertSameRows(runEngine(3), Rows.toMaps(W2.sparkReference(spark, sf, prm)),
      W2.outputCols, "W2 engine p=3 vs Spark")
  }

  test("Spark reference matches the DuckDB oracle") {
    Oracle.assertEquivalent(
      W2.sparkReference(spark, sf, prm),
      W2.duckSql(prm),
      "catalog_sales" -> TpcDsLite.catalogSales(spark, sf),
      "item" -> TpcDsLite.item(spark, sf),
      "warehouse" -> TpcDsLite.warehouse(spark),
      "date_dim" -> TpcDsLite.dateDim(spark),
      "catalog_returns" -> TpcDsLite.catalogReturns(spark, sf))
  }

  test("left join keeps unreturned sales with zero refund") {
    val rows = runEngine(1)
    assert(rows.exists(_("cr_refunded_cash") == 0.0))
    assert(rows.exists(r => r("cr_refunded_cash").toString.toDouble > 0.0))
  }

  test("price filter is applied at J1") {
    runEngine(1).foreach { r =>
      val p = in.item(r("cs_item_sk"))("i_current_price").toString.toDouble
      assert(p >= prm.priceLo && p <= prm.priceHi)
    }
  }

  test("Table 4 W2 rows: MCS structure and longest paths") {
    val df = W2.dataflow(in, prm)
    val fs = new FriesScheduler()
    def planOf(ops: String*) = fs.plan(df, ops.toSet).head
    assert(planOf("J1").components.map(_.ops) == Vector(Set("J1")))
    assert(planOf("J1").longestPathLength == 0)
    assert(planOf("J2").components.map(_.ops) == Vector(Set("J2")))
    assert(planOf("J1", "J3").components.map(_.ops) == Vector(Set("J1", "J2", "J3")))
    assert(planOf("J1", "J3").longestPathLength == 2)
    assert(planOf("J1", "J4").components.map(_.ops) == Vector(Set("J1", "J2", "J3", "J4")))
    assert(planOf("J1", "J4").longestPathLength == 3)
    assert(planOf("J3", "J4").components.map(_.ops) == Vector(Set("J3", "J4")))
    assert(planOf("J3", "J4").longestPathLength == 1)
    // All joins are one-to-one (PK/FK): heads are the earliest reconfig ops.
    assert(planOf("J1", "J4").components.head.heads == Set("J1"))
  }
}
