package repro.bench

import repro.SparkSpec
import repro.experiments.Table7

/** Reproduces Table 7 (channels between all workers vs MCS workers) — a
  * structural property that matches the paper exactly.
  */
class Table7Bench extends SparkSpec {

  private lazy val rows = Table7.run(spark, sf = 0.001)

  test("table 7: measured rows (printed for EXPERIMENTS.md)") {
    println(Table7.format(rows))
    assert(rows.size == Table7.paper.size)
  }

  test("table 7: exact match with the paper at every worker count") {
    rows.foreach { r =>
      assert(r.totalChannels == r.paperTotal, s"p=${r.p} total")
      assert(r.mcsChannels == r.paperMcs, s"p=${r.p} MCS")
    }
  }

  test("table 7: channel counts follow p + 4p^2 and 3p^2") {
    rows.foreach { r =>
      assert(r.totalChannels == r.p + 4 * r.p * r.p)
      assert(r.mcsChannels == 3 * r.p * r.p)
    }
  }
}
