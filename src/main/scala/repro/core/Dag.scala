package repro.core

/** An immutable directed acyclic graph over vertices of type `V`.
  *
  * This is the graph substrate for the Fries planner: dataflow DAGs
  * (Section 2.1 of the paper) are instances with `V = String` (operator
  * names) at the logical level, or worker ids at the physical level
  * (Section 7.2).
  *
  * Construction validates that the edge endpoints exist and that the graph
  * is acyclic (the topological sort is computed eagerly and fails fast on a
  * cycle).
  *
  * @param vertices distinct vertex set, in declaration order
  * @param edges    directed edges `(from, to)`; duplicates are collapsed
  */
final case class Dag[V](vertices: Vector[V], edges: Vector[(V, V)]) {
  require(vertices.distinct.sizeIs == vertices.size, s"duplicate vertices in $vertices")

  /** Vertex set, for O(1) membership checks. */
  val vertexSet: Set[V] = vertices.toSet

  require(
    edges.forall { case (a, b) => vertexSet(a) && vertexSet(b) },
    s"edge endpoint not in vertex set: ${edges.filterNot { case (a, b) => vertexSet(a) && vertexSet(b) }}")

  /** Distinct edge list (declaration order preserved for the first sighting). */
  val edgeList: Vector[(V, V)] = edges.distinct

  /** Adjacency: children of each vertex (empty for sinks). */
  val out: Map[V, Vector[V]] =
    edgeList.groupMap(_._1)(_._2).withDefaultValue(Vector.empty)

  /** Reverse adjacency: parents of each vertex (empty for sources). */
  val in: Map[V, Vector[V]] =
    edgeList.groupMap(_._2)(_._1).withDefaultValue(Vector.empty)

  /** Kahn topological order; `require`-fails if the edge set has a cycle. */
  val topo: Vector[V] = {
    val indeg = scala.collection.mutable.Map.from(vertices.map(v => v -> in(v).size))
    val queue = scala.collection.mutable.Queue.from(vertices.filter(v => indeg(v) == 0))
    val order = Vector.newBuilder[V]
    var seen = 0
    while (queue.nonEmpty) {
      val v = queue.dequeue()
      order += v
      seen += 1
      out(v).foreach { w =>
        indeg(w) -= 1
        if (indeg(w) == 0) queue.enqueue(w)
      }
    }
    require(seen == vertices.size, s"graph has a cycle: $edges")
    order.result()
  }

  /** Vertices with no incoming edges. */
  def heads: Vector[V] = vertices.filter(v => in(v).isEmpty)

  /** Vertices with no outgoing edges. */
  def sinks: Vector[V] = vertices.filter(v => out(v).isEmpty)

  /** All proper descendants of `v` (excludes `v` itself). */
  def descendants(v: V): Set[V] = reach(v, out)

  /** All proper ancestors of `v` (excludes `v` itself). */
  def ancestors(v: V): Set[V] = reach(v, in)

  /** True iff a directed path `from ⇝ to` exists (a vertex reaches itself). */
  def reaches(from: V, to: V): Boolean = from == to || descendants(from)(to)

  private def reach(v: V, adj: Map[V, Vector[V]]): Set[V] = {
    val seen = scala.collection.mutable.Set.empty[V]
    val stack = scala.collection.mutable.Stack.from(adj(v))
    while (stack.nonEmpty) {
      val w = stack.pop()
      if (seen.add(w)) stack.pushAll(adj(w))
    }
    seen.toSet
  }

  /** The sub-DAG induced by `keep`: vertices in `keep` plus the edges whose
    * endpoints are both in `keep`.
    */
  def induced(keep: Set[V]): Dag[V] =
    Dag(vertices.filter(keep), edgeList.filter { case (a, b) => keep(a) && keep(b) })

  /** Weakly connected components (edge direction ignored), each returned as
    * an induced sub-DAG, in order of their smallest vertex position.
    * Runs in O(V + E) via union-find-free BFS.
    */
  def weakComponents: Vector[Dag[V]] = {
    val undirected: Map[V, Vector[V]] =
      vertices.map(v => v -> (out(v) ++ in(v))).toMap
    val seen = scala.collection.mutable.Set.empty[V]
    val comps = Vector.newBuilder[Dag[V]]
    vertices.foreach { v =>
      if (!seen(v)) {
        val member = scala.collection.mutable.Set(v)
        seen += v
        val queue = scala.collection.mutable.Queue(v)
        while (queue.nonEmpty) {
          undirected(queue.dequeue()).foreach { w =>
            if (seen.add(w)) { member += w; queue.enqueue(w) }
          }
        }
        comps += induced(member.toSet)
      }
    }
    comps.result()
  }
}

object Dag {

  /** Convenience constructor from edge pairs plus any isolated vertices. */
  def of[V](edges: Seq[(V, V)], isolated: Seq[V] = Seq.empty[V]): Dag[V] = {
    val vs = (edges.flatMap(e => Seq(e._1, e._2)) ++ isolated).distinct.toVector
    Dag(vs, edges.toVector)
  }
}
