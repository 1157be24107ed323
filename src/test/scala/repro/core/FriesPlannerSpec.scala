package repro.core

import org.scalatest.funsuite.AnyFunSuite

class FriesPlannerSpec extends AnyFunSuite {

  private val oneToOne: String => OpMeta = _ => OpMeta.oneToOne
  private def metaOf(m: Map[String, OpMeta]): String => OpMeta =
    n => m.getOrElse(n, OpMeta.oneToOne)

  // ------------------------------------------------- Algorithm 2 (5.3)
  test("Figure 2 chain: reconfig {FM, MC} forms one component headed by FM") {
    val g = Dag.of(Seq("SRC" -> "FC", "FC" -> "FM", "FM" -> "MC", "MC" -> "SINK"))
    val plan = FriesPlanner.planOneToOne(g, Set("FM", "MC"))
    assert(plan.components.size == 1)
    val c = plan.components.head
    assert(c.ops == Set("FM", "MC"))
    assert(c.heads == Set("FM"))
    assert(c.edges == Set("FM" -> "MC"))
    assert(c.longestPathLength == 1)
  }

  test("Figure 6: reconfig {C, D} forms two singleton components") {
    val g = Dag.of(Seq("SRC" -> "X", "X" -> "C", "X" -> "D", "C" -> "U", "D" -> "U"))
    val plan = FriesPlanner.planOneToOne(g, Set("C", "D"))
    assert(plan.components.map(_.ops).toSet == Set(Set("C"), Set("D")))
    assert(plan.components.forall(_.longestPathLength == 0))
  }

  test("Figure 7: reconfig {C, F, G} — components and heads") {
    val g = Dag.of(Seq(
      "A" -> "C", "C" -> "D", "C" -> "E", "D" -> "F", "E" -> "F",
      "B" -> "G", "F" -> "H", "G" -> "H"))
    val plan = FriesPlanner.planOneToOne(g, Set("C", "F", "G"))
    val byOps = plan.components.map(c => c.ops -> c).toMap
    assert(byOps.keySet == Set(Set("C", "D", "E", "F"), Set("G")))
    assert(byOps(Set("C", "D", "E", "F")).heads == Set("C"))
    assert(byOps(Set("G")).heads == Set("G"))
    assert(byOps(Set("C", "D", "E", "F")).longestPathLength == 2)
  }

  test("every component contains a reconfiguration operator (Lemma 5.6)") {
    val g = Dag.of(Seq("A" -> "B", "B" -> "C", "A" -> "D", "D" -> "C"))
    val plan = FriesPlanner.planOneToOne(g, Set("B", "D"))
    plan.components.foreach(c => assert(c.reconfigOps.nonEmpty))
  }

  // ------------------------------------------------- Algorithm 3 (6.2)
  test("Figure 8: one-to-many Join ancestor pulled into the MCS") {
    // FC -> J(one-to-many) -> SP -> {FMX, FMY} -> U
    val g = Dag.of(Seq("FC" -> "J", "J" -> "SP", "SP" -> "FMX", "SP" -> "FMY",
      "FMX" -> "U", "FMY" -> "U"))
    val meta = metaOf(Map("J" -> OpMeta(oneToMany = true)))
    val plan = FriesPlanner.plan(g, Set("FMX"), meta, pruning = false)
    assert(plan.components.size == 1)
    val c = plan.components.head
    assert(c.ops == Set("J", "SP", "FMX"))
    assert(c.heads == Set("J"))
    assert(c.reconfigOps == Set("FMX"))
  }

  test("Figure 8 variant: reconfiguring U adds both earliest one-to-many ancestors") {
    // If FMX and FMY are the only one-to-many operators, U's earliest
    // one-to-many ancestors are both of them (Section 6.2).
    val g = Dag.of(Seq("FC" -> "J", "J" -> "SP", "SP" -> "FMX", "SP" -> "FMY",
      "FMX" -> "U", "FMY" -> "U"))
    val meta = metaOf(Map("FMX" -> OpMeta(oneToMany = true), "FMY" -> OpMeta(oneToMany = true)))
    val plan = FriesPlanner.plan(g, Set("U"), meta, pruning = false)
    assert(plan.syncSet == Set("U", "FMX", "FMY"))
    assert(plan.components.size == 1)
    assert(plan.components.head.ops == Set("FMX", "FMY", "U"))
    assert(plan.components.head.heads == Set("FMX", "FMY"))
  }

  test("Algorithm 2 naively applied to one-to-many dataflow misses the Join") {
    val g = Dag.of(Seq("FC" -> "J", "J" -> "SP", "SP" -> "FMX"))
    val plan = FriesPlanner.planOneToOne(g, Set("FMX"))
    assert(plan.components.head.ops == Set("FMX")) // the unsound plan of Section 6.1
  }

  test("earliest ancestors: only minimal one-to-many ancestors are added") {
    // J1 -> J2 chain of one-to-many ops: only J1 (the earliest) is added.
    val g = Dag.of(Seq("S" -> "J1", "J1" -> "J2", "J2" -> "E"))
    val meta = metaOf(Map("J1" -> OpMeta(oneToMany = true), "J2" -> OpMeta(oneToMany = true)))
    val plan = FriesPlanner.plan(g, Set("E"), meta, pruning = false)
    assert(plan.syncSet == Set("E", "J1"))
    // The MCS still spans J1..E because J2 is on the path.
    assert(plan.components.head.ops == Set("J1", "J2", "E"))
  }

  test("reconfiguration op with no one-to-many ancestor stays alone") {
    val g = Dag.of(Seq("S" -> "A", "A" -> "J", "J" -> "B"))
    val meta = metaOf(Map("J" -> OpMeta(oneToMany = true)))
    val plan = FriesPlanner.plan(g, Set("A"), meta, pruning = false)
    assert(plan.components.map(_.ops) == Vector(Set("A")))
  }

  // ------------------------------------------------- Algorithm 4 (6.3)
  private val repMeta = OpMeta(oneToMany = true, edgeWiseOneToOne = true)

  test("Figure 9 (I): replicate pruned when one branch holds the reconfig op") {
    // RE -> C -> E (reconfig), RE -> D
    val g = Dag.of(Seq("S" -> "RE", "RE" -> "C", "RE" -> "D", "C" -> "E"))
    val meta = metaOf(Map("RE" -> repMeta))
    val pruned = FriesPlanner.plan(g, Set("E"), meta, pruning = true)
    assert(pruned.components.map(_.ops) == Vector(Set("E")))
    val unpruned = FriesPlanner.plan(g, Set("E"), meta, pruning = false)
    assert(unpruned.components.head.ops == Set("RE", "C", "E"))
  }

  test("Figure 9 (II): replicate not pruned when both branches hold reconfig ops") {
    val g = Dag.of(Seq("S" -> "RE", "RE" -> "C", "RE" -> "D", "C" -> "E", "D" -> "F"))
    val meta = metaOf(Map("RE" -> repMeta))
    val plan = FriesPlanner.plan(g, Set("E", "F"), meta, pruning = true)
    assert(plan.components.size == 1)
    assert(plan.components.head.ops == Set("RE", "C", "D", "E", "F"))
    assert(plan.components.head.heads == Set("RE"))
  }

  test("Figure 9 (III): replicate not pruned when a downstream op receives both copies") {
    // RE -> C -> X, RE -> D -> X; X (reconfig) receives all replicated tuples.
    val g = Dag.of(Seq("S" -> "RE", "RE" -> "C", "RE" -> "D", "C" -> "X", "D" -> "X"))
    val meta = metaOf(Map("RE" -> repMeta))
    val plan = FriesPlanner.plan(g, Set("X"), meta, pruning = true)
    assert(plan.components.head.ops == Set("RE", "C", "D", "X"))
  }

  test("Figure 10: uniqueness pruning through a self-join") {
    // RE -> C -> SJ, RE -> D -> SJ, SJ(unique) -> E (reconfig)
    val g = Dag.of(Seq("S" -> "RE", "RE" -> "C", "RE" -> "D", "C" -> "SJ", "D" -> "SJ",
      "SJ" -> "E"))
    val meta = metaOf(Map("RE" -> repMeta, "SJ" -> OpMeta(uniquePerTxn = true)))
    val pruned = FriesPlanner.plan(g, Set("E"), meta, pruning = true)
    assert(pruned.components.map(_.ops) == Vector(Set("E")))
    val unpruned = FriesPlanner.plan(g, Set("E"), meta, pruning = false)
    assert(unpruned.components.head.ops == Set("RE", "C", "D", "SJ", "E"))
  }

  test("uniqueness pruning requires the unique op on every path") {
    // RE -> C -> SJ -> E and RE -> D -> E (bypassing SJ): cannot prune.
    val g = Dag.of(Seq("S" -> "RE", "RE" -> "C", "RE" -> "D", "C" -> "SJ",
      "SJ" -> "E", "D" -> "E"))
    val meta = metaOf(Map(
      "RE" -> OpMeta(oneToMany = true), "SJ" -> OpMeta(uniquePerTxn = true)))
    val plan = FriesPlanner.plan(g, Set("E"), meta, pruning = true)
    assert(plan.components.head.ops == Set("RE", "C", "D", "SJ", "E"))
  }

  test("uniqueness pruning ignores the endpoints themselves") {
    // A direct edge RE -> E has no intermediate unique op even if E is unique.
    val g = Dag.of(Seq("S" -> "RE", "RE" -> "E", "RE" -> "D"))
    val meta = metaOf(Map(
      "RE" -> OpMeta(oneToMany = true), "E" -> OpMeta(uniquePerTxn = true)))
    assert(!FriesPlanner.pruneUniqueness(g, "RE", "E", meta))
  }

  test("edge-wise rule needs the edge-wise one-to-one property") {
    // A true one-to-many (unnest) ancestor is not pruned even with a
    // single reconfig branch.
    val g = Dag.of(Seq("S" -> "UN", "UN" -> "C", "UN" -> "D", "C" -> "E"))
    val meta = metaOf(Map("UN" -> OpMeta(oneToMany = true)))
    val plan = FriesPlanner.plan(g, Set("E"), meta, pruning = true)
    assert(plan.components.head.ops == Set("UN", "C", "E"))
  }

  test("plan rejects empty or unknown reconfigurations") {
    val g = Dag.of(Seq("A" -> "B"))
    assertThrows[IllegalArgumentException](FriesPlanner.plan(g, Set.empty, oneToOne))
    assertThrows[IllegalArgumentException](FriesPlanner.plan(g, Set("Z"), oneToOne))
  }

  test("longest path length of multi-head component") {
    val plan = ComponentPlan[String](
      ops = Set("A", "B", "C", "D"),
      edges = Set("A" -> "C", "B" -> "C", "C" -> "D"),
      heads = Set("A", "B"),
      reconfigOps = Set("D"))
    assert(plan.longestPathLength == 2)
  }

  test("singleton component has longest path 0") {
    val plan = ComponentPlan[String](Set("A"), Set.empty, Set("A"), Set("A"))
    assert(plan.longestPathLength == 0)
  }
}
