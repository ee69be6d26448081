package repro.core.rules

import scala.collection.mutable
import scala.util.control.NonFatal

import org.apache.spark.sql.catalyst.expressions._
import org.apache.spark.sql.catalyst.plans.Inner
import org.apache.spark.sql.catalyst.plans.logical._
import org.apache.spark.sql.catalyst.rules.Rule
import org.apache.spark.sql.execution.datasources.LogicalRelation

import repro.core.ce.Estimator
import repro.core.opt._
import repro.core.stats.Catalog
import repro.workload.{EqPred, InPred, Pred, RangePred}

/** Catalyst integration of the reproduction's planner: a `Rule[LogicalPlan]`
  * injected via `spark.experimental.extraOptimizations` (it then runs in the
  * optimizer's trailing "User Provided Optimizers" batch, after predicate
  * pushdown and column pruning).
  *
  * The rule extracts each maximal inner-equi-join tree, re-derives the query's
  * join graph (leaves are identified through their catalog tables, filters
  * through the pushed-down `Filter` conditions), plans it with [[DPPlanner]]
  * and the supplied estimator, and rewrites the `Join` tree into the chosen
  * order. A `Project` on top restores the original output order. The rewrite
  * is deterministic and idempotent, so the fixed-point batch converges.
  *
  * Anything the extractor does not understand (non-inner joins, non-equi
  * conditions, leaves without a catalog table, unsupported predicate shapes)
  * leaves the plan untouched.
  */
final class JoinReorderRule(catalog: Catalog, cost: CostModel, mkEstimator: Catalog => Estimator)
    extends Rule[LogicalPlan] {

  override def apply(plan: LogicalPlan): LogicalPlan = rewriteTop(plan)

  private def rewriteTop(p: LogicalPlan): LogicalPlan = p match {
    case j: Join => tryRewrite(j).getOrElse(j.mapChildren(rewriteTop))
    case other   => other.mapChildren(rewriteTop)
  }

  // ---- extraction --------------------------------------------------------

  /** Flatten a tree of inner joins into (leaves, all equi conjuncts). */
  private def flatten(p: LogicalPlan): Option[(Vector[LogicalPlan], Vector[Expression])] =
    p match {
      case Join(l, r, Inner, cond, _) =>
        for {
          (ll, lc) <- flatten(l)
          (rl, rc) <- flatten(r)
        } yield (ll ++ rl, lc ++ rc ++ cond.toVector.flatMap(splitConjuncts))
      case other => Some((Vector(other), Vector.empty))
    }

  private def splitConjuncts(e: Expression): Vector[Expression] = e match {
    case And(a, b) => splitConjuncts(a) ++ splitConjuncts(b)
    case x         => Vector(x)
  }

  private def litLong(e: Expression): Option[Long] = e match {
    case Literal(v: Long, _)  => Some(v)
    case Literal(v: Int, _)   => Some(v.toLong)
    case Literal(v: Short, _) => Some(v.toLong)
    case Cast(c, _, _, _)     => litLong(c)
    case _                    => None
  }

  /** Leaf -> (catalog table name, extracted predicates). None if the leaf is
    * not analyzable (no catalog table / unsupported predicate).
    */
  private def leafInfo(leaf: LogicalPlan): Option[(String, Vector[Pred])] = {
    val tables = leaf.collectLeaves().collect {
      case lr: LogicalRelation if lr.catalogTable.isDefined =>
        lr.catalogTable.get.identifier.table
    }
    if (tables.size != 1) return None
    val conds = leaf.collect { case Filter(c, _) => splitConjuncts(c) }.flatten
    val preds   = Vector.newBuilder[Pred]
    val loBound = mutable.Map.empty[String, Long]
    val hiBound = mutable.Map.empty[String, Long]
    for (c <- conds) c match {
      case IsNotNull(_)                   => ()
      case EqualTo(a: AttributeReference, l) if litLong(l).isDefined =>
        preds += EqPred(a.name, litLong(l).get)
      case EqualTo(l, a: AttributeReference) if litLong(l).isDefined =>
        preds += EqPred(a.name, litLong(l).get)
      case In(a: AttributeReference, vs) if vs.forall(litLong(_).isDefined) =>
        preds += InPred(a.name, vs.map(litLong(_).get))
      case InSet(a: AttributeReference, vs) =>
        preds += InPred(a.name, vs.toSeq.collect { case l: java.lang.Long => l.longValue
                                                   case i: java.lang.Integer => i.longValue })
      case GreaterThanOrEqual(a: AttributeReference, l) if litLong(l).isDefined =>
        loBound(a.name) = math.max(loBound.getOrElse(a.name, Long.MinValue), litLong(l).get)
      case LessThanOrEqual(a: AttributeReference, l) if litLong(l).isDefined =>
        hiBound(a.name) = math.min(hiBound.getOrElse(a.name, Long.MaxValue), litLong(l).get)
      case GreaterThan(a: AttributeReference, l) if litLong(l).isDefined =>
        loBound(a.name) = math.max(loBound.getOrElse(a.name, Long.MinValue), litLong(l).get + 1)
      case LessThan(a: AttributeReference, l) if litLong(l).isDefined =>
        hiBound(a.name) = math.min(hiBound.getOrElse(a.name, Long.MaxValue), litLong(l).get - 1)
      case _ => return None
    }
    for (col <- loBound.keySet ++ hiBound.keySet)
      preds += RangePred(col,
        loBound.getOrElse(col, Long.MinValue / 4), hiBound.getOrElse(col, Long.MaxValue / 4))
    Some((tables.head, preds.result()))
  }

  // ---- rewrite -----------------------------------------------------------

  private def tryRewrite(j: Join): Option[LogicalPlan] =
    try {
      val (leaves0, conds) = flatten(j).getOrElse(return None)
      if (leaves0.size < 3) return None
      // canonical leaf order (stable across optimizer iterations) so the
      // rewrite is idempotent regardless of the current tree shape
      val leaves = leaves0.sortBy(_.output.headOption.map(_.exprId.id).getOrElse(0L))
      val infos  = leaves.map(leafInfo)
      if (infos.exists(_.isEmpty)) return None

      // attribute exprId -> leaf index
      val attrLeaf = mutable.Map.empty[ExprId, (Int, Attribute)]
      for ((leaf, i) <- leaves.zipWithIndex; a <- leaf.output) attrLeaf(a.exprId) = (i, a)

      // union-find over attributes joined by equality
      val parent = mutable.Map.empty[ExprId, ExprId]
      def find(x: ExprId): ExprId = {
        val p = parent.getOrElse(x, x)
        if (p == x) x else { val r = find(p); parent(x) = r; r }
      }
      val equalities = conds.map {
        case EqualTo(a: AttributeReference, b: AttributeReference)
            if attrLeaf.contains(a.exprId) && attrLeaf.contains(b.exprId) &&
               attrLeaf(a.exprId)._1 != attrLeaf(b.exprId)._1 =>
          parent(find(a.exprId)) = find(b.exprId)
          (a, b)
        case _ => return None // non-equi join condition: bail out
      }
      if (equalities.isEmpty) return None

      val eqAttrs: Vector[Attribute] =
        equalities.flatMap(e => Vector(e._1, e._2)).distinctBy(_.exprId)
      val classAttrs: Vector[Vector[(Int, Attribute)]] =
        eqAttrs.groupBy(a => find(a.exprId)).values
          .map(_.map(a => (attrLeaf(a.exprId)._1, a))
                .distinctBy(x => (x._1, x._2.exprId)).sortBy(_._1))
          .filter(_.map(_._1).distinct.size >= 2)
          .toVector.sortBy(_.head._2.exprId.id)

      val rels = leaves.zipWithIndex.map { case (_, i) =>
        val (table, preds) = infos(i).get
        GraphRel(s"l$i", table, preds, 1L << i)
      }
      val classes = classAttrs.zipWithIndex.map { case (ms, ci) =>
        GraphClass(ci, ms.map { case (i, a) => (i, a.name) })
      }
      val g = JoinGraph(s"catalyst", rels, classes)
      if (!g.connected(g.fullMask)) return None

      val planner = new DPPlanner(cost, catalog)
      val result  = planner.plan(g, mkEstimator(catalog))

      def build(p: Plan): LogicalPlan = p match {
        case l: LeafPlan => leaves(l.relIdx)
        case jp: JoinPlan =>
          val cross = g.crossClasses(jp.left.mask, jp.right.mask)
          val cond = cross.map { c =>
            val la = classAttrs(c.origId).find(m => (jp.left.mask & (1L << m._1)) != 0).get._2
            val ra = classAttrs(c.origId).find(m => (jp.right.mask & (1L << m._1)) != 0).get._2
            EqualTo(la, ra): Expression
          }.reduce(And)
          Join(build(jp.left), build(jp.right), Inner, Some(cond), JoinHint.NONE)
      }
      val rebuilt = build(result.plan)
      if (rebuilt.output == j.output) Some(rebuilt)
      else Some(Project(j.output, rebuilt))
    } catch { case NonFatal(_) => None }
}
