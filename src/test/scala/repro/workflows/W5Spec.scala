package repro.workflows

import repro.{Oracle, SparkSpec}
import repro.data.{Payments, Rows}
import repro.dataflow.Engine
import repro.sched.FriesScheduler

/** W5 (replicate + self-join): three-way equivalence and the Table 6 MCS /
  * pruning expectations.
  */
class W5Spec extends SparkSpec {

  private val sf = 0.004
  private val prm = W5.Params(p = 1, window = 10)
  private lazy val rows = Rows.toMaps(Payments.payments(spark, sf))

  private def runEngine(p: Int): Vector[Map[String, Any]] = {
    val engine = new Engine(W5.dataflow(rows, prm.copy(p = p)))
    engine.start()
    engine.awaitCompletion(120_000)
    engine.collected("SINK").map(_.values)
  }

  test("engine output matches the Spark twin-window reference (p=1)") {
    Rows.assertSameRows(runEngine(1), Rows.toMaps(W5.sparkReference(spark, sf, prm)),
      W5.outputCols, "W5 engine vs Spark")
  }

  test("Spark reference matches the DuckDB oracle") {
    Oracle.assertEquivalent(
      W5.sparkReference(spark, sf, prm),
      W5.duckSql(prm),
      "payments" -> Payments.payments(spark, sf))
  }

  test("self-join fuses every replicated pair exactly once under parallelism") {
    val out = runEngine(2)
    assert(out.size == rows.size)
    assert(out.map(_("p_id").toString.toLong).sorted == rows.map(_("p_id").toString.toLong).sorted)
    out.foreach(r => assert(r.contains("score_u") && r.contains("score_m")))
  }

  test("Table 6 rows: pruned vs unpruned MCS") {
    val df = W5.dataflow(rows, prm)
    def mcs(pruning: Boolean, ops: String*): Vector[Set[String]] =
      new FriesScheduler(pruning).plan(df, ops.toSet).head.components.map(_.ops)

    // FD4: edge-wise one-to-one rule prunes RE.
    assert(mcs(pruning = true, "FD4") == Vector(Set("FD4")))
    assert(mcs(pruning = false, "FD4") == Vector(Set("RE", "F4", "FD4")))
    // F3: same rule on the other branch.
    assert(mcs(pruning = true, "F3") == Vector(Set("F3")))
    assert(mcs(pruning = false, "F3") == Vector(Set("RE", "FD3", "S1", "F3")))
    // F4.
    assert(mcs(pruning = true, "F4") == Vector(Set("F4")))
    assert(mcs(pruning = false, "F4") == Vector(Set("RE", "F4")))
    // FD3 + FD4: both branches are targeted — no pruning possible.
    assert(mcs(pruning = true, "FD3", "FD4") == Vector(Set("RE", "FD3", "F4", "FD4")))
    assert(mcs(pruning = false, "FD3", "FD4") == Vector(Set("RE", "FD3", "F4", "FD4")))
    // E1: uniqueness rule prunes through the self-join.
    assert(mcs(pruning = true, "E1") == Vector(Set("E1")))
    assert(mcs(pruning = false, "E1") ==
      Vector(Set("RE", "FD3", "S1", "F3", "F4", "FD4", "SJ", "E1")))
  }

  test("the unpruned E1 MCS has eight edges (paper: 'from eight to zero')") {
    val df = W5.dataflow(rows, prm)
    val unpruned = new FriesScheduler(pruning = false).plan(df, Set("E1")).head
    assert(unpruned.components.head.edges.size == 8)
    val pruned = new FriesScheduler(pruning = true).plan(df, Set("E1")).head
    assert(pruned.components.head.edges.isEmpty)
  }

  test("unpruned component heads are the replicate operator") {
    val df = W5.dataflow(rows, prm)
    val plan = new FriesScheduler(pruning = false).plan(df, Set("FD4")).head
    assert(plan.components.head.heads == Set("RE"))
  }
}
