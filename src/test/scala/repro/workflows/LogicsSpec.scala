package repro.workflows

import org.scalatest.funsuite.AnyFunSuite
import repro.dataflow.DTuple
import repro.workflows.Logics._

/** Pure unit tests of the operator-logic library (no engine, no Spark). */
class LogicsSpec extends AnyFunSuite {

  private def t(values: (String, Any)*): DTuple = DTuple(1L, 0, values.toMap)

  test("MapFilter projects and filters") {
    val l = new MapFilter(m => if (m("k").asInstanceOf[Long] % 2 == 0) Some(m + ("even" -> true)) else None)
    assert(l.process(t("k" -> 2L)).map(_._1("even")) == Seq(true))
    assert(l.process(t("k" -> 3L)).isEmpty)
  }

  test("Pass emits the tuple unchanged on port 0") {
    val l = new Pass()
    assert(l.process(t("a" -> 1)) == Seq((Map("a" -> 1), 0)))
  }

  test("Router picks the port") {
    val l = new Router(m => m("k").asInstanceOf[Long].toInt % 3)
    assert(l.process(t("k" -> 5L)).head._2 == 2)
    assert(l.process(t("k" -> 3L)).head._2 == 0)
  }

  test("LookupJoin inner: hit merges, miss drops") {
    val l = new LookupJoin(Map[Any, Map[String, Any]](1L -> Map("name" -> "x")), "k")
    assert(l.process(t("k" -> 1L)).head._1("name") == "x")
    assert(l.process(t("k" -> 9L)).isEmpty)
  }

  test("LookupJoin post-filter drops merged rows") {
    val l = new LookupJoin(Map[Any, Map[String, Any]](1L -> Map("p" -> 5.0)), "k",
      postFilter = m => m("p").asInstanceOf[Double] > 10)
    assert(l.process(t("k" -> 1L)).isEmpty)
  }

  test("LookupJoin left: miss emits defaults") {
    val l = new LookupJoin(Map.empty[Any, Map[String, Any]], "k",
      leftDefaults = Some(Map("name" -> "none")))
    assert(l.process(t("k" -> 1L)).head._1("name") == "none")
  }

  test("LookupJoin2 joins on a composite key") {
    val l = new LookupJoin2(Map[(Any, Any), Map[String, Any]]((1L, 2L) -> Map("v" -> 9)), "a", "b")
    assert(l.process(t("a" -> 1L, "b" -> 2L)).head._1("v") == 9)
    assert(l.process(t("a" -> 1L, "b" -> 3L)).isEmpty)
  }

  test("Unnest explodes the list column and drops it from outputs") {
    val l = new Unnest("xs")
    val out = l.process(t("u" -> 7L, "xs" -> Vector(Map("i" -> 1), Map("i" -> 2))))
    assert(out.map(_._1) == Seq(Map("u" -> 7L, "i" -> 1), Map("u" -> 7L, "i" -> 2)))
  }

  test("Unnest of an empty list emits nothing") {
    val l = new Unnest("xs")
    assert(l.process(t("u" -> 7L, "xs" -> Vector.empty[Map[String, Any]])).isEmpty)
  }

  test("UnnestToAll emits every element on every port") {
    val l = new UnnestToAll("xs", 2)
    val out = l.process(t("u" -> 7L, "xs" -> Vector(Map("i" -> 1))))
    assert(out.map(_._2).sorted == Seq(0, 1))
  }

  test("Replicate emits one copy per port in order") {
    val l = new Replicate(3)
    assert(l.process(t("a" -> 1)).map(_._2) == Seq(0, 1, 2))
  }

  test("SelfJoin holds the first twin and fuses on the second") {
    val l = new SelfJoin("k")
    assert(l.process(t("k" -> 1L, "left" -> true)).isEmpty)
    assert(l.state.asInstanceOf[Map[Any, _]].size == 1)
    val fused = l.process(t("k" -> 1L, "right" -> true))
    assert(fused.head._1 == Map("k" -> 1L, "left" -> true, "right" -> true))
    assert(l.state.asInstanceOf[Map[Any, _]].isEmpty)
  }

  test("SelfJoin keeps distinct keys pending independently") {
    val l = new SelfJoin("k")
    l.process(t("k" -> 1L))
    l.process(t("k" -> 2L))
    assert(l.state.asInstanceOf[Map[Any, _]].keySet == Set(1L, 2L))
  }

  test("FraudScore windows per key and scores the average") {
    val l = new FraudScore("u", "amt", "s", window = 3)
    def score(u: Long, amt: Double): Double =
      l.process(t("u" -> u, "amt" -> amt)).head._1("s").asInstanceOf[Double]
    assert(score(1, 10) == 10.0)
    assert(score(1, 20) == 15.0)
    assert(score(1, 30) == 20.0)
    assert(score(1, 40) == 30.0) // window 3: (20+30+40)/3
    assert(score(2, 8) == 8.0) // independent key
  }

  test("FraudScore emits the model tag") {
    val l = new FraudScore("u", "amt", "s", 3, modelTag = 7)
    assert(l.process(t("u" -> 1L, "amt" -> 1.0)).head._1("s_model") == 7)
  }

  test("FraudScore.rewindow truncates carried-over state") {
    val old = Map[Any, Vector[Double]](1L -> Vector(1, 2, 3, 4, 5))
    val re = FraudScore.rewindow(2)(old).asInstanceOf[Map[Any, Vector[Double]]]
    assert(re(1L) == Vector(4.0, 5.0))
    assert(FraudScore.rewindow(2)(null).asInstanceOf[Map[Any, Vector[Double]]].isEmpty)
  }

  test("FraudScore initial state seeds the window") {
    val l = new FraudScore("u", "amt", "s", 3, initial = Map(1L -> Vector(10.0, 20.0)))
    assert(l.process(t("u" -> 1L, "amt" -> 30.0)).head._1("s") == 20.0)
  }

  test("CountByKey is blocking: emits only at finish") {
    val l = new CountByKey("k")
    assert(l.process(t("k" -> 1L)).isEmpty)
    l.process(t("k" -> 1L)); l.process(t("k" -> 2L))
    val out = l.onFinish().map(_._1)
    assert(out.toSet == Set(Map("k" -> 1L, "count" -> 2L), Map("k" -> 2L, "count" -> 1L)))
  }

  test("FmLogic emits p_m(10) only in the new configuration") {
    val oldFm = new FigOne.FmLogic(0)
    val out0 = oldFm.process(t("p_merchant" -> 1L, "p_amount" -> 5.0)).head._1
    assert(out0.contains("score_m") && !out0.contains("score_m10"))
    val newFm = new FigOne.FmLogic(1, oldFm.state.asInstanceOf[Map[Any, Vector[Double]]])
    val out1 = newFm.process(t("p_merchant" -> 1L, "p_amount" -> 7.0)).head._1
    assert(out1.contains("score_m10"))
    // State carried over: window now holds [5, 7].
    assert(out1("score_m10") == 6.0)
  }

  test("McLogic new config flags the schema mismatch") {
    val mc = new FigOne.McLogic(1)
    val bad = mc.process(t("score_c" -> 1.0, "score_m" -> 1.0)).head._1
    assert(bad("mc_error") == true)
    val good = mc.process(t("score_c" -> 1.0, "score_m" -> 1.0, "score_m10" -> 1.0)).head._1
    assert(good("mc_error") == false)
    assert(math.abs(good("combined").asInstanceOf[Double] - 1.0) < 1e-9)
  }
}
