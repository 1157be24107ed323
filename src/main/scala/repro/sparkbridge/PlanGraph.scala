package repro.sparkbridge

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.catalyst.plans.logical._
import repro.core.{Dag, OpMeta}

/** Bridge from Catalyst logical plans to the Fries planner's graph model.
  *
  * The paper's contribution is a control-plane scheduler, not a query
  * rewrite, so it does not map to an optimizer `Rule[LogicalPlan]`; what
  * the planner needs from the query layer is (a) the operator DAG and
  * (b) the one-to-one / one-to-many / blocking classification of each
  * operator (Definitions 5.1/5.2, Section 7.1). This object derives both
  * from a DataFrame's analyzed logical plan, so a Fries MCS can be planned
  * for a pipeline expressed in the DataFrame API:
  *
  *   - Project / Filter / union legs ............ one-to-one
  *   - equi-Join (PK/FK probe, left/inner) ...... one-to-one
  *   - non-equi or cross Join ................... one-to-many
  *   - Generate (explode / unnest) .............. one-to-many
  *   - Aggregate / Sort / GlobalLimit ........... blocking (pipeline breaker)
  */
object PlanGraph {

  final case class Node(name: String, meta: OpMeta, blocking: Boolean, plan: LogicalPlan)

  final case class Graph(dag: Dag[String], nodes: Map[String, Node]) {
    def meta(name: String): OpMeta = nodes.get(name).map(_.meta).getOrElse(OpMeta.oneToOne)
    def blockingOps: Set[String] = nodes.values.filter(_.blocking).map(_.name).toSet
  }

  /** Build the operator DAG of a DataFrame's analyzed logical plan. Node
    * names are `<OpClass>#<i>` with `i` a stable preorder index; edges
    * point from producers (children) to consumers (parents), i.e. in
    * dataflow direction.
    */
  def fromDataFrame(df: DataFrame): Graph = fromPlan(df.queryExecution.analyzed)

  def fromPlan(root: LogicalPlan): Graph = {
    val nodes = Vector.newBuilder[Node]
    val edges = Vector.newBuilder[(String, String)]
    var counter = 0

    def visit(p: LogicalPlan): String = {
      val name = s"${p.nodeName}#$counter"
      counter += 1
      nodes += Node(name, classify(p), isBlocking(p), p)
      p.children.foreach { child =>
        val childName = visit(child)
        edges += (childName -> name)
      }
      name
    }

    visit(root)
    val ns = nodes.result()
    Graph(Dag(ns.map(_.name), edges.result()), ns.map(n => n.name -> n).toMap)
  }

  /** One-to-one vs one-to-many classification (Definitions 5.1 / 5.2). */
  def classify(p: LogicalPlan): OpMeta = p match {
    case _: Generate => OpMeta(oneToMany = true)
    case j: Join =>
      val equi = j.condition.exists(c =>
        c.find {
          case org.apache.spark.sql.catalyst.expressions.EqualTo(_, _) => true
          case _ => false
        }.isDefined)
      if (equi) OpMeta.oneToOne else OpMeta(oneToMany = true)
    case _ => OpMeta.oneToOne
  }

  def isBlocking(p: LogicalPlan): Boolean = p match {
    case _: Aggregate | _: Sort | _: GlobalLimit => true
    case _ => false
  }
}
