package repro.core

/** Minimal covering sub-DAG (MCS), Definition 5.4 / Algorithm 1 of the
  * Fries paper.
  *
  * Given a dataflow DAG `G` and a set of vertices `M` (the reconfiguration
  * operators, possibly augmented with one-to-many ancestors by the planner),
  * the MCS is the unique minimal sub-DAG that contains `M` and every path
  * between two members of `M`. Its weakly connected components are the
  * synchronization units of the Fries scheduler.
  */
object Mcs {

  /** Algorithm 1: two sweeps over a topological order.
    *
    * A vertex is "red" if it is in `M` or a descendant of a member of `M`;
    * "blue" if in `M` or an ancestor of a member. Vertices that are both are
    * exactly those on some `M`-to-`M` path (or in `M`), and every edge whose
    * endpoints are both kept lies on such a path. O(V + E).
    */
  def find[V](g: Dag[V], m: Set[V]): Dag[V] = {
    require(m.subsetOf(g.vertexSet), s"M ${m.diff(g.vertexSet)} not in graph")
    val red = scala.collection.mutable.Set.empty[V]
    g.topo.foreach { v =>
      if (m(v) || g.in(v).exists(red)) red += v
    }
    val blue = scala.collection.mutable.Set.empty[V]
    g.topo.reverseIterator.foreach { v =>
      if (m(v) || g.out(v).exists(blue)) blue += v
    }
    g.induced(g.vertices.filter(v => red(v) && blue(v)).toSet)
  }

  /** Components of the MCS, Section 5.3: maximal weakly connected
    * sub-DAGs. Each one is scheduled independently by Fries (FCM to its
    * heads, epoch marker within).
    */
  def components[V](g: Dag[V], m: Set[V]): Vector[Dag[V]] =
    find(g, m).weakComponents

  /** Reference implementation by definition, used to property-test
    * [[find]]: keep `M`, every vertex `v` with `a ⇝ v ⇝ b` for some
    * `a, b ∈ M`, and every edge `(u, w)` with `a ⇝ u` and `w ⇝ b`.
    * Quadratic; test-only.
    */
  def bruteForce[V](g: Dag[V], m: Set[V]): Dag[V] = {
    def onPath(v: V): Boolean =
      m.exists(a => g.reaches(a, v)) && m.exists(b => g.reaches(v, b))
    val keepV = g.vertices.filter(v => m(v) || onPath(v)).toSet
    val keepE = g.edgeList.filter { case (u, w) =>
      m.exists(a => g.reaches(a, u)) && m.exists(b => g.reaches(w, b))
    }
    Dag(g.vertices.filter(keepV), keepE)
  }
}
