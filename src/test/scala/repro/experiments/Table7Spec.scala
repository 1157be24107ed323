package repro.experiments

import repro.SparkSpec

/** Table 7 is purely structural (channel counts in the parallel dataflow),
  * so the unit test asserts an exact match with the paper.
  */
class Table7Spec extends SparkSpec {

  test("channel counts match the paper exactly for every worker count") {
    val rows = Table7.run(spark, sf = 0.001)
    rows.foreach { r =>
      assert(r.totalChannels == r.paperTotal,
        s"p=${r.p}: total ${r.totalChannels} != paper ${r.paperTotal}")
      assert(r.mcsChannels == r.paperMcs,
        s"p=${r.p}: MCS ${r.mcsChannels} != paper ${r.paperMcs}")
    }
  }

  test("MCS channels are always a strict subset of all channels") {
    Table7.run(spark, sf = 0.001).foreach { r =>
      assert(r.mcsChannels < r.totalChannels)
    }
  }

  test("formatting includes every row") {
    val rows = Table7.run(spark, sf = 0.001)
    val s = Table7.format(rows)
    assert(Seq("6440", "4800", "1620", "588", "68").forall(s.contains))
  }
}
