package repro.bench

import repro.SparkSpec
import repro.experiments.Table5

/** Reproduces Table 5 (W4 with the one-to-many unnest): Fries vs Epoch. */
class Table5Bench extends SparkSpec {

  private lazy val rows = Table5.run(spark, sf = 0.02, p = 2, warmupMs = 1500)

  test("table 5: measured rows (printed for EXPERIMENTS.md)") {
    println(Table5.format(rows))
    assert(rows.size == Table5.paperRows.size)
  }

  test("table 5 shape: Fries is at or below Epoch on every row") {
    rows.foreach { r =>
      assert(r.friesMs <= r.epochMs * 1.1,
        s"${r.paper.ops}: fries ${r.friesMs} > epoch ${r.epochMs}")
    }
  }

  test("table 5 shape: {F1,U2} reconfigures fast under both schedulers") {
    val fast = rows.find(_.paper.ops == Seq("F1", "U2")).get
    val slow = rows.find(_.paper.ops == Seq("FD1")).get
    assert(fast.friesMs < slow.friesMs / 2,
      s"{F1,U2} fries ${fast.friesMs}ms not well below {FD1} fries ${slow.friesMs}ms")
  }

  test("table 5 shape: {FD1} is slow even under Fries (marker crosses FD1's backlog)") {
    val fd1 = rows.find(_.paper.ops == Seq("FD1")).get
    assert(fd1.friesMs > 100,
      s"{FD1} fries ${fd1.friesMs}ms — expected a visible marker-propagation delay")
    assert(fd1.friesMs < fd1.epochMs)
  }

  test("table 5 shape: {F2} spans both branches and is the slowest Fries row") {
    val f2 = rows.find(_.paper.ops == Seq("F2")).get
    val fd1 = rows.find(_.paper.ops == Seq("FD1")).get
    assert(f2.friesMs >= fd1.friesMs * 0.8,
      s"{F2} fries ${f2.friesMs}ms unexpectedly below {FD1} ${fd1.friesMs}ms")
  }
}
