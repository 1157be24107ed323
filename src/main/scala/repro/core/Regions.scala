package repro.core

/** Pipelined-region splitting for dataflows with blocking operators
  * (Section 7.1).
  *
  * All operators upstream of a blocking operator B finish before the
  * operators downstream of B start, so the dataflow can be cut at the
  * outgoing edges of blocking operators into sub-dataflows of pipelined
  * operators only; Fries then runs on the sub-dataflow that is currently
  * executing.
  */
object Regions {

  /** Weakly connected components after cutting every out-edge of a blocking
    * vertex. The blocking vertex itself stays in its upstream region (it
    * runs, consuming, while that region executes).
    */
  def pipelinedRegions[V](g: Dag[V], blocking: Set[V]): Vector[Dag[V]] = {
    val kept = g.edgeList.filterNot { case (a, _) => blocking(a) }
    Dag(g.vertices, kept).weakComponents
  }

  /** The region containing vertex `v`. */
  def regionOf[V](g: Dag[V], blocking: Set[V], v: V): Dag[V] =
    pipelinedRegions(g, blocking).find(_.vertexSet(v)).get
}
