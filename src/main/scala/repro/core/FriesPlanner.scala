package repro.core

/** Per-operator properties consulted by the Fries planner.
  *
  * @param oneToMany        Definition 5.2 — may emit more than one
  *                         (tuple, receiver) pair per input tuple
  *                         (e.g. non-key join, unnest/flatten, replicate).
  * @param edgeWiseOneToOne Section 6.3 rule 1 precondition — the operator
  *                         emits at most one tuple *per output edge* per
  *                         input tuple (e.g. replicate / broadcast).
  * @param uniquePerTxn     Section 6.3 rule 2 — the operator emits at most
  *                         one output tuple per data transaction (e.g. a
  *                         self-join on a key that fuses replicated twins).
  */
final case class OpMeta(
    oneToMany: Boolean = false,
    edgeWiseOneToOne: Boolean = false,
    uniquePerTxn: Boolean = false)

object OpMeta {
  val oneToOne: OpMeta = OpMeta()
}

/** One synchronization unit of a reconfiguration: a weakly connected
  * component of the MCS.
  *
  * @param ops   operators in the component
  * @param edges MCS edges inside the component — the only edges epoch
  *              markers travel during this reconfiguration
  * @param heads operators with no in-component input edge; the controller
  *              sends the FCM directly to these and they start the marker
  * @param reconfigOps the subset of `ops` that actually change function
  */
final case class ComponentPlan[V](
    ops: Set[V],
    edges: Set[(V, V)],
    heads: Set[V],
    reconfigOps: Set[V]) {

  /** Number of edges on a longest directed path within the component —
    * the "longest path length" column of Tables 4–6.
    */
  def longestPathLength: Int = {
    val dag = Dag.of(edges.toSeq, ops.toSeq)
    val depth = scala.collection.mutable.Map.empty[V, Int]
    dag.topo.foreach { v =>
      depth(v) = (dag.in(v).map(depth) :+ 0).max + (if (dag.in(v).isEmpty) 0 else 1)
    }
    if (depth.isEmpty) 0 else depth.values.max
  }
}

/** The full plan for one reconfiguration request. */
final case class ReconfigPlan[V](
    syncSet: Set[V],
    mcs: Dag[V],
    components: Vector[ComponentPlan[V]]) {

  /** All MCS operators, across components. */
  def mcsOps: Set[V] = mcs.vertexSet

  /** Largest per-component longest path — the delay-driving quantity. */
  def longestPathLength: Int =
    if (components.isEmpty) 0 else components.map(_.longestPathLength).max
}

/** The Fries scheduler's planning phase: Algorithms 2 (one-to-one only),
  * 3 (general dataflows) and 4 (with MCS pruning) of the paper. The
  * execution phase (sending FCMs, propagating markers) lives in
  * `repro.sched.FriesScheduler`; this object is pure graph computation so
  * it can be unit-tested exhaustively.
  */
object FriesPlanner {

  /** Algorithm 2 — valid only when every operator is one-to-one. */
  def planOneToOne[V](g: Dag[V], reconfigOps: Set[V]): ReconfigPlan[V] =
    assemble(g, reconfigOps, reconfigOps)

  /** Algorithms 3 and 4.
    *
    * For each reconfiguration operator `o`, its ancestor one-to-many
    * operators are collected; with `pruning` enabled the two Section 6.3
    * rules drop those that need no synchronization; the earliest survivors
    * are added to the synchronization set `M` before computing the MCS.
    *
    * @param meta per-operator properties; unlisted vertices are one-to-one
    */
  def plan[V](
      g: Dag[V],
      reconfigOps: Set[V],
      meta: V => OpMeta,
      pruning: Boolean = true): ReconfigPlan[V] = {
    require(reconfigOps.nonEmpty, "empty reconfiguration")
    require(reconfigOps.subsetOf(g.vertexSet), "reconfiguration op not in dataflow")
    var m = reconfigOps
    reconfigOps.foreach { o =>
      var anc = g.ancestors(o).filter(meta(_).oneToMany)
      if (pruning)
        anc = anc.filterNot(a => pruneEdgeWiseOneToOne(g, a, reconfigOps, meta) ||
                                 pruneUniqueness(g, a, o, meta))
      m ++= earliest(g, anc)
    }
    assemble(g, m, reconfigOps)
  }

  /** `computeEarliestAncestors`: the members of `a` with no proper ancestor
    * also in `a` (minimal elements under the DAG's reachability order).
    */
  def earliest[V](g: Dag[V], a: Set[V]): Set[V] =
    a.filter(v => !g.ancestors(v).exists(a))

  /** Section 6.3, rule 1 (edge-wise one-to-one): prune ancestor `a` when it
    * emits at most one tuple per output edge and exactly one of its output
    * edges can reach a reconfiguration operator — then only a single output
    * tuple of `a` is ever affected by the reconfiguration, so `a` behaves
    * one-to-one as far as this reconfiguration is concerned.
    */
  def pruneEdgeWiseOneToOne[V](
      g: Dag[V],
      a: V,
      reconfigOps: Set[V],
      meta: V => OpMeta): Boolean =
    meta(a).edgeWiseOneToOne && {
      val edgesToReconfig = g.out(a).distinct.count { child =>
        reconfigOps(child) || g.descendants(child).exists(reconfigOps)
      }
      edgesToReconfig == 1
    }

  /** Section 6.3, rule 2 (uniqueness): prune ancestor `a` of reconfiguration
    * operator `o` when every path `a ⇝ o` passes through an intermediate
    * operator with the uniqueness property (at most one output tuple per
    * data transaction) — the multiplicity `a` introduced has collapsed back
    * to one before reaching `o`.
    */
  def pruneUniqueness[V](g: Dag[V], a: V, o: V, meta: V => OpMeta): Boolean = {
    // A path avoiding all uniquePerTxn intermediates exists iff `o` is
    // reachable from `a` in the graph with those intermediates removed.
    if (!g.reaches(a, o)) return false
    val blocked: V => Boolean = v => v != a && v != o && meta(v).uniquePerTxn
    val seen = scala.collection.mutable.Set.empty[V]
    val stack = scala.collection.mutable.Stack(a)
    while (stack.nonEmpty) {
      val v = stack.pop()
      if (v == o) return false // unblocked path found: cannot prune
      if (!blocked(v)) g.out(v).foreach(w => if (seen.add(w)) stack.push(w))
    }
    true
  }

  private def assemble[V](g: Dag[V], m: Set[V], reconfigOps: Set[V]): ReconfigPlan[V] = {
    val mcs = Mcs.find(g, m)
    val comps = mcs.weakComponents.map { c =>
      ComponentPlan(
        ops = c.vertexSet,
        edges = c.edgeList.toSet,
        heads = c.heads.toSet,
        reconfigOps = c.vertexSet.intersect(reconfigOps))
    }
    ReconfigPlan(m, mcs, comps)
  }
}
