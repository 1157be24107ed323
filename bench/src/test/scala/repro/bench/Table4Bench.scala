package repro.bench

import repro.SparkSpec
import repro.experiments.Table4

/** Reproduces Table 4 (W2/W3 reconfiguration delays, Fries vs Epoch).
  * Asserts the paper's qualitative shape; absolute numbers go to stdout and
  * EXPERIMENTS.md.
  */
class Table4Bench extends SparkSpec {

  private lazy val rows = Table4.run(spark, sf = 0.02, p = 3, warmupMs = 1500)

  test("table 4: measured rows (printed for EXPERIMENTS.md)") {
    println(Table4.format(rows))
    assert(rows.size == Table4.paperRows.size)
  }

  test("table 4 shape: Fries delay is below the Epoch delay on every row") {
    rows.foreach { r =>
      assert(r.friesMs < r.epochMs,
        s"${r.paper.workflow} ${r.paper.ops}: fries ${r.friesMs} >= epoch ${r.epochMs}")
    }
  }

  test("table 4 shape: singleton-component reconfigurations are near-instant under Fries") {
    rows.filter(_.longestPath == 0).foreach { r =>
      assert(r.friesMs < 200,
        s"${r.paper.ops}: singleton component took ${r.friesMs}ms under Fries")
      assert(r.epochMs > 10 * r.friesMs,
        s"${r.paper.ops}: epoch ${r.epochMs}ms not >> fries ${r.friesMs}ms")
    }
  }

  test("table 4 shape: Fries delay grows with the MCS longest path (W2)") {
    val w2 = rows.filter(_.paper.workflow == "W2")
    val singleton = w2.filter(_.longestPath == 0).map(_.friesMs).max
    val deepest = w2.filter(_.longestPath == 3).map(_.friesMs).min
    assert(singleton < deepest,
      s"longest-path-0 fries $singleton ms !< longest-path-3 fries $deepest ms")
  }

  test("table 4: measured MCS components match the planner expectations") {
    rows.foreach { r =>
      assert(r.longestPath >= 0 && r.mcs.nonEmpty)
    }
    // Spot-check the two W2 multi-op rows against the paper's MCS column.
    val j1j4 = rows.find(r => r.paper.ops == Seq("J1", "J4")).get
    assert(j1j4.mcs.contains("J2") && j1j4.mcs.contains("J3"))
  }
}
