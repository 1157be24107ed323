package repro.workflows

import scala.collection.mutable
import repro.dataflow.{DTuple, OpLogic}

/** Reusable operator logics for the experiment workflows (Section 8.1).
  * All are deterministic in their input order; simulated per-tuple cost is
  * carried via `costNanos` so a reconfiguration can hot-replace an
  * expensive model with a cheap one (use case 2 of the paper).
  */
object Logics {

  /** One-to-one map/filter: emits `f(values)` on port 0, or nothing. */
  final class MapFilter(f: Map[String, Any] => Option[Map[String, Any]],
      override val costNanos: Long = 0L) extends OpLogic {
    override def process(t: DTuple): Seq[(Map[String, Any], Int)] =
      f(t.values).map(v => (v, 0)).toSeq
  }

  /** Identity pass-through (union inputs, relabel, cheap stage). */
  final class Pass(override val costNanos: Long = 0L) extends OpLogic {
    override def process(t: DTuple): Seq[(Map[String, Any], Int)] = Seq((t.values, 0))
  }

  /** One-to-one routing: send each tuple to the port chosen by `route`
    * (e.g. the Split operator of Figure 8, or operator X of Figure 6).
    */
  final class Router(route: Map[String, Any] => Int,
      override val costNanos: Long = 0L) extends OpLogic {
    override def process(t: DTuple): Seq[(Map[String, Any], Int)] =
      Seq((t.values, route(t.values)))
  }

  /** The probe side of a PK/FK hash join (one-to-one, Section 2.1's join
    * treatment: the build side is a pre-collected table). Emits the probe
    * tuple merged with the matching build row, or nothing on a miss /
    * failed post-filter. A left variant emits `defaults` on a miss.
    */
  final class LookupJoin(
      table: Map[Any, Map[String, Any]],
      probeKey: String,
      postFilter: Map[String, Any] => Boolean = _ => true,
      leftDefaults: Option[Map[String, Any]] = None,
      override val costNanos: Long = 0L) extends OpLogic {
    override def process(t: DTuple): Seq[(Map[String, Any], Int)] =
      table.get(t.values(probeKey)) match {
        case Some(row) =>
          val merged = t.values ++ row
          if (postFilter(merged)) Seq((merged, 0)) else Nil
        case None =>
          leftDefaults.map(d => (t.values ++ d, 0)).toSeq
      }
  }

  /** Composite-key variant of [[LookupJoin]]. */
  final class LookupJoin2(
      table: Map[(Any, Any), Map[String, Any]],
      key1: String, key2: String,
      leftDefaults: Option[Map[String, Any]] = None,
      override val costNanos: Long = 0L) extends OpLogic {
    override def process(t: DTuple): Seq[(Map[String, Any], Int)] =
      table.get((t.values(key1), t.values(key2))) match {
        case Some(row) => Seq((t.values ++ row, 0))
        case None => leftDefaults.map(d => (t.values ++ d, 0)).toSeq
      }
  }

  /** One-to-many unnest (the paper's Section 6.1 Join/unnest archetype):
    * explodes the `listCol` sequence of column-maps, emitting the parent
    * columns merged with each element.
    */
  final class Unnest(listCol: String, override val costNanos: Long = 0L) extends OpLogic {
    override def process(t: DTuple): Seq[(Map[String, Any], Int)] = {
      val parent = t.values - listCol
      t.values(listCol).asInstanceOf[Seq[Map[String, Any]]].map(e => (parent ++ e, 0))
    }
  }

  /** One-to-many unnest that sends every element to *all* `nPorts` ports
    * (W4's U2: "split all the payments of a user and sent them to both FD1
    * and FD2").
    */
  final class UnnestToAll(listCol: String, nPorts: Int,
      override val costNanos: Long = 0L) extends OpLogic {
    override def process(t: DTuple): Seq[(Map[String, Any], Int)] = {
      val parent = t.values - listCol
      for {
        e <- t.values(listCol).asInstanceOf[Seq[Map[String, Any]]]
        p <- 0 until nPorts
      } yield (parent ++ e, p)
    }
  }

  /** Replicate (Section 6.3, Figure 9): one copy of the input tuple per
    * port — one-to-many overall, one-to-one per output edge.
    */
  final class Replicate(nPorts: Int, override val costNanos: Long = 0L) extends OpLogic {
    override def process(t: DTuple): Seq[(Map[String, Any], Int)] =
      (0 until nPorts).map(p => (t.values, p))
  }

  /** Self-join on a key (Section 6.3, Figure 10): fuses the two replicated
    * twins of a tuple back into one — at most one output per data
    * transaction (the uniqueness property). State: pending unmatched rows.
    */
  final class SelfJoin(keyCol: String, override val costNanos: Long = 0L) extends OpLogic {
    private val pending = mutable.Map.empty[Any, Map[String, Any]]
    override def process(t: DTuple): Seq[(Map[String, Any], Int)] =
      pending.remove(t.values(keyCol)) match {
        case Some(other) => Seq((other ++ t.values, 0))
        case None => pending.put(t.values(keyCol), t.values); Nil
      }
    override def state: Any = pending.toMap
  }

  /** The fraud-detection inference operator (FD / FC / FM of the paper):
    * keeps the `window` most recent amounts per key and scores each tuple
    * with a stand-in for the LSTM auto-encoder — the windowed average,
    * which is deterministic and cross-checkable against SQL window
    * functions, while `costNanos` models the model's inference cost.
    *
    * @param modelTag emitted with every score so experiments can tell which
    *                 configuration processed a tuple
    */
  final class FraudScore(
      keyCol: String,
      amountCol: String,
      outCol: String,
      window: Int,
      modelTag: Int = 0,
      override val costNanos: Long = 0L,
      initial: Map[Any, Vector[Double]] = Map.empty) extends OpLogic {
    private val recent = mutable.Map.empty[Any, Vector[Double]]
    recent ++= initial

    override def process(t: DTuple): Seq[(Map[String, Any], Int)] = {
      val k = t.values(keyCol)
      val amount = t.values(amountCol) match {
        case d: Double => d
        case x => x.toString.toDouble
      }
      val q = (recent.getOrElse(k, Vector.empty) :+ amount).takeRight(window)
      recent(k) = q
      val score = q.sum / q.size
      Seq((t.values + (outCol -> score) + (s"${outCol}_model" -> modelTag), 0))
    }

    override def state: Any = recent.toMap

    /** The paper's Section 2.2 state transformation, window n -> m: keep
      * the most recent min(n, m) amounts per key.
      */
    def snapshot: Map[Any, Vector[Double]] = recent.toMap
  }

  object FraudScore {

    /** State transformation for re-windowing a FraudScore (Section 2.2's
      * T: the new state keeps the old tuples, truncated/extended to the
      * new window as tuples arrive).
      */
    def rewindow(newWindow: Int)(old: Any): Any = old match {
      case null => Map.empty[Any, Vector[Double]]
      case m: Map[_, _] =>
        m.asInstanceOf[Map[Any, Vector[Double]]].view.mapValues(_.takeRight(newWindow)).toMap
    }
  }

  /** Blocking aggregation (Section 7.1): counts per key, emitting only at
    * end of input — a pipeline breaker.
    */
  final class CountByKey(keyCol: String) extends OpLogic {
    private val counts = mutable.Map.empty[Any, Long].withDefaultValue(0L)
    override def process(t: DTuple): Seq[(Map[String, Any], Int)] = {
      counts(t.values(keyCol)) += 1; Nil
    }
    override def onFinish(): Seq[(Map[String, Any], Int)] =
      counts.toSeq.map { case (k, c) => (Map(keyCol -> k, "count" -> c), 0) }
    override def state: Any = counts.toMap
  }
}
