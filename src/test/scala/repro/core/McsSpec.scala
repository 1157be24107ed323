package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class McsSpec extends AnyFunSuite {

  /** The Figure 5 / Figure 7 dataflow of the paper: A feeds C; C fans out
    * to D and E which join at F; B feeds G; F and G feed H.
    */
  private val fig5 = Dag.of(Seq(
    "A" -> "C", "C" -> "D", "C" -> "E", "D" -> "F", "E" -> "F",
    "B" -> "G", "F" -> "H", "G" -> "H"))

  test("paper Figure 7: MCS of {C, F, G}") {
    val mcs = Mcs.find(fig5, Set("C", "F", "G"))
    assert(mcs.vertexSet == Set("C", "D", "E", "F", "G"))
    assert(mcs.edgeList.toSet ==
      Set("C" -> "D", "C" -> "E", "D" -> "F", "E" -> "F"))
  }

  test("paper Figure 7: components of the MCS") {
    val comps = Mcs.components(fig5, Set("C", "F", "G")).map(_.vertexSet)
    assert(comps.toSet == Set(Set("C", "D", "E", "F"), Set("G")))
  }

  test("MCS of a single vertex is that vertex") {
    val mcs = Mcs.find(fig5, Set("D"))
    assert(mcs.vertexSet == Set("D"))
    assert(mcs.edgeList.isEmpty)
  }

  test("MCS of two unconnected vertices has no edges") {
    val mcs = Mcs.find(fig5, Set("D", "E"))
    assert(mcs.vertexSet == Set("D", "E"))
    assert(mcs.edgeList.isEmpty)
  }

  test("MCS of chain endpoints includes the whole chain") {
    val chain = Dag.of(Seq("A" -> "B", "B" -> "C", "C" -> "D"))
    val mcs = Mcs.find(chain, Set("A", "D"))
    assert(mcs.vertexSet == Set("A", "B", "C", "D"))
    assert(mcs.edgeList.size == 3)
  }

  test("MCS includes parallel paths between members") {
    val diamond = Dag.of(Seq("A" -> "B", "A" -> "C", "B" -> "D", "C" -> "D"))
    val mcs = Mcs.find(diamond, Set("A", "D"))
    assert(mcs.vertexSet == Set("A", "B", "C", "D"))
    assert(mcs.edgeList.size == 4)
  }

  test("direct edge between members is kept even with a longer path") {
    val g = Dag.of(Seq("A" -> "B", "A" -> "C", "C" -> "B"))
    val mcs = Mcs.find(g, Set("A", "B"))
    assert(mcs.vertexSet == Set("A", "B", "C"))
    assert(mcs.edgeList.toSet == Set("A" -> "B", "A" -> "C", "C" -> "B"))
  }

  test("vertices not between members are excluded") {
    val g = Dag.of(Seq("X" -> "A", "A" -> "B", "B" -> "Y"))
    val mcs = Mcs.find(g, Set("A", "B"))
    assert(mcs.vertexSet == Set("A", "B"))
  }

  test("M must be a subset of the graph") {
    assertThrows[IllegalArgumentException](Mcs.find(fig5, Set("Z")))
  }

  test("MCS of the full vertex set is the graph itself") {
    val mcs = Mcs.find(fig5, fig5.vertexSet)
    assert(mcs.vertexSet == fig5.vertexSet)
    assert(mcs.edgeList.toSet == fig5.edgeList.toSet)
  }

  test("matches the by-definition brute force on the paper graph") {
    val subsets = Seq(Set("C", "F"), Set("A", "H"), Set("B", "H"), Set("C", "G"),
      Set("D", "E", "F"), Set("A", "F", "G"))
    subsets.foreach { m =>
      val fast = Mcs.find(fig5, m)
      val slow = Mcs.bruteForce(fig5, m)
      assert(fast.vertexSet == slow.vertexSet, s"vertices differ for M=$m")
      assert(fast.edgeList.toSet == slow.edgeList.toSet, s"edges differ for M=$m")
    }
  }

  // ----------------------------------------------------------------- random
  private def randomDag(rng: Random, n: Int, pEdge: Double): Dag[String] = {
    val vs = (0 until n).map(i => s"v$i")
    val es = for {
      i <- 0 until n; j <- i + 1 until n
      if rng.nextDouble() < pEdge
    } yield vs(i) -> vs(j)
    Dag(vs.toVector, es.toVector)
  }

  test("property: MCS == brute force on 200 random DAGs") {
    val rng = new Random(42)
    (1 to 200).foreach { _ =>
      val g = randomDag(rng, 2 + rng.nextInt(9), 0.3)
      val m = rng.shuffle(g.vertices).take(1 + rng.nextInt(3)).toSet
      val fast = Mcs.find(g, m)
      val slow = Mcs.bruteForce(g, m)
      assert(fast.vertexSet == slow.vertexSet, s"g=$g m=$m")
      assert(fast.edgeList.toSet == slow.edgeList.toSet, s"g=$g m=$m")
    }
  }

  test("property: MCS is idempotent") {
    val rng = new Random(7)
    (1 to 100).foreach { _ =>
      val g = randomDag(rng, 2 + rng.nextInt(8), 0.35)
      val m = rng.shuffle(g.vertices).take(1 + rng.nextInt(3)).toSet
      val once = Mcs.find(g, m)
      val twice = Mcs.find(once, m.intersect(once.vertexSet))
      assert(once.vertexSet == twice.vertexSet)
      assert(once.edgeList.toSet == twice.edgeList.toSet)
    }
  }

  test("property: MCS contains M and components cover the MCS") {
    val rng = new Random(99)
    (1 to 100).foreach { _ =>
      val g = randomDag(rng, 3 + rng.nextInt(8), 0.3)
      val m = rng.shuffle(g.vertices).take(1 + rng.nextInt(4)).toSet
      val mcs = Mcs.find(g, m)
      assert(m.subsetOf(mcs.vertexSet))
      val comps = mcs.weakComponents
      assert(comps.flatMap(_.vertexSet).toSet == mcs.vertexSet)
      assert(comps.flatMap(_.edgeList).toSet == mcs.edgeList.toSet)
      // Lemma 5.6: every component contains at least one member of M.
      comps.foreach(c => assert(c.vertexSet.exists(m)))
    }
  }
}
