package repro.sched

import org.scalatest.funsuite.AnyFunSuite
import repro.core.OpMeta
import repro.dataflow._
import repro.testutil.TestData
import repro.workflows.Logics._

/** Section 7.1: dataflows with blocking operators are split into pipelined
  * regions and Fries plans within the region(s) containing the targets.
  */
class BlockingSpec extends AnyFunSuite {

  private def flowWithAgg(rows: Vector[Map[String, Any]]): Dataflow =
    Dataflow(
      sources = Vector(SourceSpec("SRC", () => rows.iterator)),
      ops = Vector(
        Operator("PRE", 1, _ => new Pass),
        Operator("AGG", 1, _ => new CountByKey("p_user"), blocking = true),
        Operator("POST", 1, _ => new Pass),
        Operator("SINK", 1, _ => new CollectLogic)),
      edges = Vector(
        EdgeSpec("SRC", "PRE"), EdgeSpec("PRE", "AGG"),
        EdgeSpec("AGG", "POST"), EdgeSpec("POST", "SINK")))

  test("planning a reconfiguration downstream of the blocking op stays in its region") {
    val plans = new FriesScheduler().plan(flowWithAgg(Vector.empty), Set("POST"))
    assert(plans.size == 1)
    assert(plans.head.components.map(_.ops) == Vector(Set("POST")))
  }

  test("planning upstream + downstream targets yields one plan per region") {
    val plans = new FriesScheduler().plan(flowWithAgg(Vector.empty), Set("PRE", "POST"))
    assert(plans.size == 2)
    assert(plans.map(_.components.map(_.ops)).toSet ==
      Set(Vector(Set("PRE")), Vector(Set("POST"))))
  }

  test("without the region split, the MCS would cross the blocking op") {
    val df = flowWithAgg(Vector.empty)
    val crossing = repro.core.FriesPlanner.plan(df.dag, Set("PRE", "POST"),
      df.plannerMeta, pruning = true)
    assert(crossing.components.head.ops == Set("PRE", "AGG", "POST"))
  }

  test("end-to-end: blocking aggregation result is correct and reconfigurable") {
    val rows = TestData.payments(4000, nUsers = 8)
    val df = flowWithAgg(rows)
    val engine = new Engine(df)
    engine.start()
    // Reconfigure POST (downstream region) while the upstream region runs.
    new FriesScheduler().execute(engine, Reconfiguration.dummy("POST"), 30_000)
    engine.awaitCompletion(30_000)
    val out = engine.collected("SINK")
    val expected = rows.groupBy(_("p_user")).view.mapValues(_.size.toLong).toMap
    assert(out.map(t => t.values("p_user") -> t.values("count")).toMap == expected)
    assert(engine.workers(WorkerId("POST", 0)).currentVersion == 1)
  }

  test("broadcast edge marks the upstream op one-to-many for the planner") {
    val df = Dataflow(
      sources = Vector(SourceSpec("SRC", () => Iterator.empty)),
      ops = Vector(
        Operator("A", 1, _ => new Pass),
        Operator("B", 2, _ => new Pass),
        Operator("SINK", 1, _ => new CollectLogic)),
      edges = Vector(
        EdgeSpec("SRC", "A"),
        EdgeSpec("A", "B", Partition.Broadcast),
        EdgeSpec("B", "SINK")))
    assert(df.plannerMeta("A").oneToMany)
    // Downstream parallelism 2: a downstream reconfig touches both copies,
    // so the edge-wise pruning must not treat A as one-to-one.
    assert(!df.plannerMeta("A").edgeWiseOneToOne)
    val plans = new FriesScheduler().plan(df, Set("B"))
    assert(plans.head.components.head.ops == Set("A", "B"))
  }

  test("broadcast to a single worker stays effectively one-to-one for pruning") {
    val df = Dataflow(
      sources = Vector(SourceSpec("SRC", () => Iterator.empty)),
      ops = Vector(
        Operator("A", 1, _ => new Pass),
        Operator("B", 1, _ => new Pass),
        Operator("SINK", 1, _ => new CollectLogic)),
      edges = Vector(
        EdgeSpec("SRC", "A"),
        EdgeSpec("A", "B", Partition.Broadcast),
        EdgeSpec("B", "SINK")))
    assert(df.plannerMeta("A").edgeWiseOneToOne)
  }

  test("operator-declared meta flows through Dataflow.plannerMeta") {
    val df = Dataflow(
      sources = Vector(SourceSpec("SRC", () => Iterator.empty)),
      ops = Vector(
        Operator("UN", 1, _ => new Unnest("xs"), meta = OpMeta(oneToMany = true)),
        Operator("SINK", 1, _ => new CollectLogic)),
      edges = Vector(EdgeSpec("SRC", "UN"), EdgeSpec("UN", "SINK")))
    assert(df.plannerMeta("UN").oneToMany)
    assert(!df.plannerMeta("SINK").oneToMany)
    assert(!df.plannerMeta("SRC").oneToMany)
  }
}
