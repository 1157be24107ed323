package repro.bench

import repro.SparkSpec
import repro.experiments.Table6

/** Reproduces Table 6 (MCS pruning in W5): Fries with vs without pruning. */
class Table6Bench extends SparkSpec {

  private lazy val rows = Table6.run(spark, sf = 0.02, p = 2, warmupMs = 1500)

  test("table 6: measured rows (printed for EXPERIMENTS.md)") {
    println(Table6.format(rows))
    assert(rows.size == Table6.paperRows.size)
  }

  test("table 6: measured MCS columns match the paper") {
    rows.foreach { r =>
      def ops(s: String): Set[String] =
        s.replaceAll("[{}*]", "").split(",").map(_.trim).toSet
      assert(ops(r.mcsPruned) == ops(r.paper.paperMcsPruned),
        s"${r.paper.ops}: pruned MCS ${r.mcsPruned} != ${r.paper.paperMcsPruned}")
      assert(ops(r.mcsUnpruned) == ops(r.paper.paperMcsUnpruned),
        s"${r.paper.ops}: unpruned MCS ${r.mcsUnpruned} != ${r.paper.paperMcsUnpruned}")
    }
  }

  test("table 6 shape: pruning collapses the delay where a rule applies") {
    rows.filter(r => Set(Seq("FD4"), Seq("F3"), Seq("E1")).contains(r.paper.ops)).foreach { r =>
      assert(r.prunedMs < 200, s"${r.paper.ops}: pruned delay ${r.prunedMs}ms")
      assert(r.unprunedMs > 5 * r.prunedMs,
        s"${r.paper.ops}: unpruned ${r.unprunedMs}ms not >> pruned ${r.prunedMs}ms")
    }
  }

  test("table 6 shape: {FD3,FD4} cannot be pruned and both delays match") {
    val r = rows.find(_.paper.ops == Seq("FD3", "FD4")).get
    val ratio = r.prunedMs / r.unprunedMs
    assert(ratio > 0.5 && ratio < 2.0,
      s"{FD3,FD4}: pruned ${r.prunedMs}ms vs unpruned ${r.unprunedMs}ms should be similar")
  }

  test("table 6 shape: the uniqueness rule gives E1 the largest win") {
    val e1 = rows.find(_.paper.ops == Seq("E1")).get
    val others = rows.filter(r => r.paper.ops != Seq("E1") && r.paper.ops != Seq("FD3", "FD4"))
    val e1Win = e1.unprunedMs / math.max(e1.prunedMs, 0.001)
    others.foreach { r =>
      val win = r.unprunedMs / math.max(r.prunedMs, 0.001)
      assert(e1Win >= win * 0.3, // loose: E1's win is at least comparable to the best
        s"E1 win $e1Win not comparable to ${r.paper.ops} win $win")
    }
  }
}
