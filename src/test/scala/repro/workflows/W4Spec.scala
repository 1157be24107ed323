package repro.workflows

import repro.SparkSpec
import repro.data.{Payments, Rows}
import repro.dataflow.Engine
import repro.sched.FriesScheduler

/** W4 (dataset 2 with the one-to-many unnest U2): structural invariants of
  * the engine execution plus the Table 5 MCS expectations.
  */
class W4Spec extends SparkSpec {

  private val sf = 0.004
  private lazy val users = Rows.toMaps(Payments.paymentsByUser(spark, sf, nUsers = 50))
  private val prm = W4.Params(p = 1, window = 5)

  private def runEngine(p: Int): Engine = {
    val engine = new Engine(W4.dataflow(users, prm.copy(p = p)))
    engine.start()
    engine.awaitCompletion(120_000)
    engine
  }

  test("every payment is scored by both branches and fused exactly once") {
    val out = runEngine(1).collected("SINK")
    val totalPayments = users.map(_("p_list").asInstanceOf[Seq[_]].size).sum
    assert(out.size == totalPayments)
    out.foreach { t =>
      assert(t.values.contains("score_u"), s"missing user score: ${t.values}")
      assert(t.values.contains("score_m"), s"missing merchant score: ${t.values}")
    }
  }

  test("fused tuples keep the source transaction id of their user row") {
    val out = runEngine(1).collected("SINK")
    val byTxn = out.groupBy(_.txnId)
    val listSizes = users.map(_("p_list").asInstanceOf[Seq[_]].size).sorted
    assert(byTxn.values.map(_.size).toVector.sorted == listSizes)
  }

  test("parallel execution fuses the same set of payments") {
    val p1 = runEngine(1).collected("SINK").map(_.long("p_id")).sorted
    val p2 = runEngine(2).collected("SINK").map(_.long("p_id")).sorted
    assert(p1 == p2)
  }

  test("user scores are windowed averages in list order (p=1)") {
    val out = runEngine(1).collected("SINK")
    val byUser = out.groupBy(_.long("p_user"))
    byUser.foreach { case (_, ts) =>
      val ordered = ts.sortBy(_.long("p_id"))
      val amounts = ordered.map(_.double("p_amount"))
      ordered.zipWithIndex.foreach { case (t, i) =>
        val w = amounts.slice(math.max(0, i - prm.window + 1), i + 1)
        assert(math.abs(t.double("score_u") - w.sum / w.size) < 1e-9)
      }
    }
  }

  test("Table 5 rows: MCS structure around the one-to-many unnest") {
    val df = W4.dataflow(users, prm)
    val fs = new FriesScheduler()
    def planOf(ops: String*) = fs.plan(df, ops.toSet).head
    // {F1, U2}: both are targets; F1 heads the component.
    val a = planOf("F1", "U2").components
    assert(a.map(_.ops) == Vector(Set("F1", "U2")))
    assert(a.head.heads == Set("F1"))
    assert(a.head.longestPathLength == 1)
    // {FD1}: U2 is the earliest one-to-many ancestor and heads the MCS.
    val b = planOf("FD1").components
    assert(b.map(_.ops) == Vector(Set("U2", "FD1")))
    assert(b.head.heads == Set("U2"))
    assert(b.head.longestPathLength == 1)
    // {F2}: the MCS spans U2 and both inference branches.
    val c = planOf("F2").components
    assert(c.map(_.ops) == Vector(Set("U2", "FD1", "FD2", "F2")))
    assert(c.head.heads == Set("U2"))
    assert(c.head.longestPathLength == 2)
  }

  test("the unnest cannot be pruned (it is a true one-to-many)") {
    val df = W4.dataflow(users, prm)
    val plans = new FriesScheduler(pruning = true).plan(df, Set("FD1"))
    assert(plans.head.components.head.ops == Set("U2", "FD1"))
  }
}
