package repro.workflows

import repro.{Oracle, SparkSpec}
import repro.data.{Payments, Rows}
import repro.dataflow.{Engine, Reconfiguration}
import repro.sched.FriesScheduler

/** W1 (fraud detection over the payment stream): the FD score computed by
  * the engine matches the SQL window-function formulation on Spark and
  * DuckDB, and a hot model replacement carries the state over.
  */
class W1Spec extends SparkSpec {

  private val sf = 0.004
  private val prm = W1.Params(p = 1, window = 10)
  private lazy val rows = Rows.toMaps(Payments.payments(spark, sf))
  private val cols = Seq("p_id", "p_user", "p_amount", "score_u")

  private def runEngine(p: Int): Vector[Map[String, Any]] = {
    val engine = new Engine(W1.dataflow(rows, prm.copy(p = p)))
    engine.start()
    engine.awaitCompletion(120_000)
    engine.collected("SINK").map(_.values)
  }

  test("engine FD score matches the Spark window reference (p=1)") {
    Rows.assertSameRows(runEngine(1), Rows.toMaps(W1.sparkReference(spark, sf, prm)),
      cols, "W1 engine vs Spark")
  }

  test("per-user streams keep the windowed score correct under parallelism") {
    // Hash partitioning by user preserves per-user order, so the score is
    // unchanged at p=4.
    Rows.assertSameRows(runEngine(4), Rows.toMaps(W1.sparkReference(spark, sf, prm)),
      cols, "W1 engine p=4 vs Spark")
  }

  test("Spark window reference matches the DuckDB oracle") {
    Oracle.assertEquivalent(
      W1.sparkReference(spark, sf, prm),
      W1.duckSql(prm),
      "payments" -> Payments.payments(spark, sf))
  }

  test("hot model replacement keeps per-user state (use case 2)") {
    val engine = new Engine(W1.dataflow(rows, prm.copy(srcRate = 3000)))
    engine.start()
    Thread.sleep(200)
    val update = W1.cheaperModel(prm, newCostNanos = 0, modelTag = 1)
    new FriesScheduler().execute(engine,
      Reconfiguration.of("FD" -> update), 60_000)
    engine.awaitCompletion(120_000)
    val out = engine.collected("SINK").map(_.values)
    assert(out.exists(_("score_u_model") == 0) && out.exists(_("score_u_model") == 1),
      "reconfiguration did not land mid-stream")
    // The windowed score is oblivious to the model swap because the state
    // was carried over: the full output still matches the reference.
    Rows.assertSameRows(out, Rows.toMaps(W1.sparkReference(spark, sf, prm)),
      cols, "W1 with mid-stream model swap vs Spark")
  }
}
