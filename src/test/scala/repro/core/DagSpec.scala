package repro.core

import org.scalatest.funsuite.AnyFunSuite

class DagSpec extends AnyFunSuite {

  private val chain = Dag.of(Seq("A" -> "B", "B" -> "C", "C" -> "D"))
  private val diamond = Dag.of(Seq("A" -> "B", "A" -> "C", "B" -> "D", "C" -> "D"))

  test("vertices and edges are registered") {
    assert(chain.vertexSet == Set("A", "B", "C", "D"))
    assert(chain.edgeList.size == 3)
  }

  test("duplicate edges are collapsed") {
    val g = Dag(Vector("A", "B"), Vector("A" -> "B", "A" -> "B"))
    assert(g.edgeList.size == 1)
  }

  test("edge endpoint must exist") {
    assertThrows[IllegalArgumentException](Dag(Vector("A"), Vector("A" -> "B")))
  }

  test("cycles are rejected") {
    assertThrows[IllegalArgumentException](
      Dag(Vector("A", "B"), Vector("A" -> "B", "B" -> "A")))
  }

  test("self-loop is rejected") {
    assertThrows[IllegalArgumentException](Dag(Vector("A"), Vector("A" -> "A")))
  }

  test("topological order respects edges") {
    val order = diamond.topo.zipWithIndex.toMap
    diamond.edgeList.foreach { case (a, b) => assert(order(a) < order(b)) }
  }

  test("heads and sinks") {
    assert(diamond.heads == Vector("A"))
    assert(diamond.sinks == Vector("D"))
  }

  test("descendants excludes self") {
    assert(chain.descendants("B") == Set("C", "D"))
    assert(chain.descendants("D") == Set.empty[String])
  }

  test("ancestors excludes self") {
    assert(chain.ancestors("C") == Set("A", "B"))
    assert(diamond.ancestors("D") == Set("A", "B", "C"))
  }

  test("reaches is reflexive and transitive") {
    assert(chain.reaches("A", "A"))
    assert(chain.reaches("A", "D"))
    assert(!chain.reaches("D", "A"))
  }

  test("induced subgraph keeps only internal edges") {
    val g = diamond.induced(Set("A", "B", "D"))
    assert(g.vertexSet == Set("A", "B", "D"))
    assert(g.edgeList.toSet == Set("A" -> "B", "B" -> "D"))
  }

  test("weak components of a disconnected graph") {
    val g = Dag.of(Seq("A" -> "B", "C" -> "D"), isolated = Seq("E"))
    val comps = g.weakComponents.map(_.vertexSet)
    assert(comps.toSet == Set(Set("A", "B"), Set("C", "D"), Set("E")))
  }

  test("weak components ignore edge direction") {
    // A -> C <- B is one weak component.
    val g = Dag.of(Seq("A" -> "C", "B" -> "C"))
    assert(g.weakComponents.size == 1)
  }

  test("empty-edge DAG: every vertex its own component") {
    val g = Dag(Vector("A", "B", "C"), Vector.empty)
    assert(g.weakComponents.size == 3)
  }
}
