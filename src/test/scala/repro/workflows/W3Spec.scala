package repro.workflows

import repro.{Oracle, SparkSpec}
import repro.data.{Rows, TpcDsLite}
import repro.dataflow.Engine
import repro.sched.FriesScheduler

/** W3 (TPC-DS query 71 probe side): engine vs Spark vs DuckDB equivalence
  * plus the Table 4 MCS structure (noting the two-stage union U1/U2 that
  * stands in for the paper's single U1 vertex).
  */
class W3Spec extends SparkSpec {

  private val sf = 0.02
  private val prm = W3.Params(p = 1, mgrMax = 40, year = 1997)
  private lazy val in = W3.inputs(spark, sf)

  private def runEngine(p: Int): Vector[Map[String, Any]] = {
    val engine = new Engine(W3.dataflow(in, prm.copy(p = p)))
    engine.start()
    engine.awaitCompletion(120_000)
    engine.collected("SINK").map(_.values)
  }

  test("engine output matches the Spark DataFrame reference (p=1)") {
    val engineRows = runEngine(1)
    assert(engineRows.nonEmpty)
    Rows.assertSameRows(engineRows, Rows.toMaps(W3.sparkReference(spark, sf, prm)),
      W3.outputCols, "W3 engine vs Spark")
  }

  test("engine output is identical under parallelism (p=2)") {
    Rows.assertSameRows(runEngine(2), Rows.toMaps(W3.sparkReference(spark, sf, prm)),
      W3.outputCols, "W3 engine p=2 vs Spark")
  }

  test("Spark reference matches the DuckDB oracle") {
    Oracle.assertEquivalent(
      W3.sparkReference(spark, sf, prm),
      W3.duckSql(prm),
      "web_sales" -> TpcDsLite.webSales(spark, sf),
      "catalog_sales" -> TpcDsLite.catalogSales(spark, sf),
      "store_sales" -> TpcDsLite.storeSales(spark, sf),
      "item" -> TpcDsLite.item(spark, sf),
      "time_dim" -> TpcDsLite.timeDim(spark),
      "date_dim" -> TpcDsLite.dateDim(spark))
  }

  test("all three channels contribute") {
    val channels = runEngine(1).map(_("channel")).toSet
    assert(channels == Set("web", "catalog", "store"))
  }

  test("meal-time filter holds on every output row") {
    runEngine(1).foreach { r =>
      assert(Set("breakfast", "dinner")(r("t_meal_time").toString))
    }
  }

  test("Table 4 W3 rows: MCS structure and longest paths") {
    val df = W3.dataflow(in, prm)
    val fs = new FriesScheduler()
    def planOf(ops: String*) = fs.plan(df, ops.toSet).head
    assert(planOf("J5").components.map(_.ops) == Vector(Set("J5")))
    assert(planOf("J5").longestPathLength == 0)
    // {J5, J6}: two singleton components — reconfigured in parallel.
    assert(planOf("J5", "J6").components.map(_.ops).toSet == Set(Set("J5"), Set("J6")))
    assert(planOf("J5", "J6").longestPathLength == 0)
    // {J5,J6,J7,J8}: one component through the (two-stage) union.
    val c1 = planOf("J5", "J6", "J7", "J8").components
    assert(c1.map(_.ops) == Vector(Set("J5", "J6", "U1", "J7", "U2", "J8")))
    assert(c1.head.heads == Set("J5", "J6", "J7"))
    assert(c1.head.longestPathLength == 3) // J5 -> U1 -> U2 -> J8
    val c2 = planOf("J5", "J6", "J7", "J9").components
    assert(c2.map(_.ops) == Vector(Set("J5", "J6", "U1", "J7", "U2", "J8", "J9")))
    assert(c2.head.longestPathLength == 4)
    val c3 = planOf("J7", "J8", "J9").components
    assert(c3.map(_.ops) == Vector(Set("J7", "U2", "J8", "J9")))
    assert(c3.head.longestPathLength == 3)
    assert(c3.head.heads == Set("J7"))
  }
}
