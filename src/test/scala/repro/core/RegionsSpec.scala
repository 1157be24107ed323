package repro.core

import org.scalatest.funsuite.AnyFunSuite

class RegionsSpec extends AnyFunSuite {

  // S -> A -> AGG(blocking) -> B -> T
  private val g = Dag.of(Seq("S" -> "A", "A" -> "AGG", "AGG" -> "B", "B" -> "T"))

  test("blocking operator splits the dataflow into two pipelined regions") {
    val regions = Regions.pipelinedRegions(g, Set("AGG")).map(_.vertexSet)
    assert(regions.toSet == Set(Set("S", "A", "AGG"), Set("B", "T")))
  }

  test("the blocking operator stays in its upstream region") {
    val r = Regions.regionOf(g, Set("AGG"), "AGG")
    assert(r.vertexSet == Set("S", "A", "AGG"))
  }

  test("no blocking operators: one region") {
    assert(Regions.pipelinedRegions(g, Set.empty).size == 1)
  }

  test("two blocking operators: three regions") {
    val g2 = Dag.of(Seq("S" -> "B1", "B1" -> "A", "A" -> "B2", "B2" -> "T"))
    val regions = Regions.pipelinedRegions(g2, Set("B1", "B2")).map(_.vertexSet)
    assert(regions.toSet == Set(Set("S", "B1"), Set("A", "B2"), Set("T")))
  }

  test("region split preserves internal edges") {
    val r = Regions.regionOf(g, Set("AGG"), "B")
    assert(r.edgeList.toSet == Set("B" -> "T"))
  }

  test("Fries planning confined to one region") {
    val region = Regions.regionOf(g, Set("AGG"), "A")
    val plan = FriesPlanner.plan(region, Set("A"), (_: String) => OpMeta.oneToOne)
    assert(plan.components.map(_.ops) == Vector(Set("A")))
  }

  test("blocking op with a join downstream keeps parallel branches together") {
    val g3 = Dag.of(Seq("S" -> "AGG", "AGG" -> "B", "AGG" -> "C", "B" -> "D", "C" -> "D"))
    val regions = Regions.pipelinedRegions(g3, Set("AGG")).map(_.vertexSet)
    assert(regions.toSet == Set(Set("S", "AGG"), Set("B", "C", "D")))
  }
}
