package repro.catalyst

import org.apache.spark.sql.catalyst.expressions._
import org.apache.spark.sql.catalyst.expressions.aggregate._
import org.apache.spark.sql.catalyst.plans.Inner
import org.apache.spark.sql.catalyst.plans.logical._
import org.apache.spark.sql.catalyst.rules.Rule
import org.apache.spark.sql.types.StringType
import repro.core._

/** Registered PK-FK constraints — the stand-in for the catalog's declared
  * key constraints that rule R1 relies on ("If one or more columns in Φ are
  * the PK columns … of the dimension tables"). Register pairs as
  * `(pkColumn, fkColumn)` by name.
  */
object PkFkHints {
  private val hints = scala.collection.concurrent.TrieMap.empty[(String, String), Unit]
  def register(pk: String, fk: String): Unit = hints.put((pk.toLowerCase, fk.toLowerCase), ())
  def clear(): Unit = hints.clear()
  def isRegistered(pk: String, fk: String): Boolean = hints.contains((pk.toLowerCase, fk.toLowerCase))
}

/** R1 — Φ(R ⋈ S) ≡ Φ^k(R) ⋈ S (Table 3): when the only dimension-side
  * column COMPARE references is the join's PK, replace it with the fact-side
  * FK and drop the join entirely (COMPARE's output needs no other dimension
  * columns; referential integrity is asserted by the [[PkFkHints]]
  * registration). Output attributes are preserved, so parents are unaffected.
  */
object PushCompareBelowJoin extends Rule[LogicalPlan] {
  override def apply(plan: LogicalPlan): LogicalPlan = plan.transformUp {
    case cn @ CompareNode(spec, topK, Join(left, right, Inner, Some(cond), _), out) =>
      tryPush(spec, topK, left, right, cond, out).getOrElse(cn)
  }

  private def tryPush(spec: CompareSpec, topK: Option[TopK], left: LogicalPlan,
                      right: LogicalPlan, cond: Expression,
                      out: Seq[Attribute]): Option[LogicalPlan] = cond match {
    case EqualTo(a: AttributeReference, b: AttributeReference) =>
      def sideOf(attr: AttributeReference): Option[Boolean] = // true = left
        if (left.outputSet.contains(attr)) Some(true)
        else if (right.outputSet.contains(attr)) Some(false) else None
      (sideOf(a), sideOf(b)) match {
        case (Some(sa), Some(sb)) if sa != sb =>
          val (l, r) = if (sa) (a, b) else (b, a) // l on left, r on right
          push(spec, topK, left, l, right, r, out)
            .orElse(push(spec, topK, right, r, left, l, out))
        case _ => None
      }
    case _ => None
  }

  /** Attempt with `fact` holding the FK `fk` and `dim` holding the PK `pk`. */
  private def push(spec: CompareSpec, topK: Option[TopK], fact: LogicalPlan,
                   fk: AttributeReference, dim: LogicalPlan, pk: AttributeReference,
                   out: Seq[Attribute]): Option[LogicalPlan] = {
    if (!PkFkHints.isRegistered(pk.name, fk.name)) return None
    val factCols = fact.output.map(_.name.toLowerCase).toSet
    val dimCols  = dim.output.map(_.name.toLowerCase).toSet
    val refs = spec.referencedColumns.map(_.toLowerCase)
    val dimRefs = refs.filter(c => dimCols.contains(c) && !factCols.contains(c))
    if (dimRefs != Seq(pk.name.toLowerCase)) return None
    if (!refs.forall(c => factCols.contains(c) || c == pk.name.toLowerCase)) return None

    def rename(n: String): String = if (n.equalsIgnoreCase(pk.name)) fk.name else n
    def renameTs(ts: TrendsetSpec): TrendsetSpec = TrendsetSpec(
      ts.constraint.map(t => t.copy(attr = rename(t.attr))),
      ts.gms.map(g => g.copy(grouping = rename(g.grouping), measure = rename(g.measure))))
    val spec2 = CompareSpec(renameTs(spec.t1), renameTs(spec.t2), spec.scorer)
    Some(CompareNode(spec2, topK, fact, out))
  }
}

/** R3 — σ_C(Φ(R)) ≡ Φ(σ_C(R)) for predicates on the partitioning column
  * (Table 3). The filter above Φ references output columns `a_1`/`a_2`; when
  * both sides are restricted to the same value set for the same base
  * attribute, that restriction is pushed to the input as `a IN (…)` (the
  * original filter is kept — it is cheap and keeps the rewrite trivially
  * sound).
  */
object PushFilterBelowCompare extends Rule[LogicalPlan] {
  override def apply(plan: LogicalPlan): LogicalPlan = plan.transformUp {
    case f @ Filter(cond, cn @ CompareNode(spec, topK, child, out))
        if spec.t1.attrs == spec.t2.attrs =>
      val conjuncts = splitConjuncts(cond)
      val pushable = spec.t1.freeAttrs.flatMap { a =>
        for {
          s1 <- valueSet(conjuncts, cn.output, s"${a}_1")
          s2 <- valueSet(conjuncts, cn.output, s"${a}_2")
          if s1 == s2
        } yield (a, s1)
      }
      if (pushable.isEmpty) f
      else {
        val childFilters = pushable.map { case (a, vs) =>
          val attr = child.output.find(_.name.equalsIgnoreCase(a)).get
          In(Cast(attr, StringType), vs.toSeq.sortBy(_.toString).map(Literal(_, StringType)))
        }
        val pushed = childFilters.reduce[Expression](And(_, _))
        child match {
          case Filter(existing, _) if existing.semanticEquals(pushed) => f // already pushed
          case _ => Filter(cond, cn.copy(child = Filter(pushed, child)))
        }
      }
  }

  private def splitConjuncts(e: Expression): Seq[Expression] = e match {
    case And(l, r) => splitConjuncts(l) ++ splitConjuncts(r)
    case other     => Seq(other)
  }

  /** The value set an output column is restricted to, if a conjunct pins it. */
  private def valueSet(conjuncts: Seq[Expression], out: Seq[Attribute],
                       colName: String): Option[Set[Any]] = {
    conjuncts.collectFirst {
      case EqualTo(a: AttributeReference, Literal(v, StringType))
          if a.name.equalsIgnoreCase(colName) && out.exists(_.exprId == a.exprId) => Set(v)
      case EqualTo(Literal(v, StringType), a: AttributeReference)
          if a.name.equalsIgnoreCase(colName) && out.exists(_.exprId == a.exprId) => Set(v)
      case In(a: AttributeReference, vs)
          if a.name.equalsIgnoreCase(colName) && out.exists(_.exprId == a.exprId) &&
            vs.forall(_.isInstanceOf[Literal]) =>
        vs.map(_.asInstanceOf[Literal].value).toSet
    }
  }
}

/** R2 — Υ_{G,A}(Φ(R)) ≡ Φ(Υ_{G,A}(R)) when Φ's measure aggregates are
  * duplicate-insensitive (Table 3 requires A ∈ {MAX, MIN}). Realized as
  * inserting a duplicate-removing aggregate over exactly the columns Φ
  * touches: MIN/MAX trends are invariant to duplicate removal, and the
  * smaller input shrinks every partition (§8.4's experiment).
  */
object DedupBelowCompare extends Rule[LogicalPlan] {
  override def apply(plan: LogicalPlan): LogicalPlan = plan.transformUp {
    case cn @ CompareNode(spec, topK, child, out)
        if (spec.t1.gms ++ spec.t2.gms).forall(g => g.agg == AggKind.Min || g.agg == AggKind.Max) &&
          !alreadyDeduped(spec, child) =>
      val cols = spec.referencedColumns.flatMap(c => child.output.find(_.name.equalsIgnoreCase(c)))
      if (cols.size == spec.referencedColumns.size)
        cn.copy(child = Aggregate(cols, cols, child))
      else cn
  }

  private def alreadyDeduped(spec: CompareSpec, child: LogicalPlan): Boolean = child match {
    case Aggregate(g, a, _, _) =>
      g.toSet == a.toSet && a.map(_.asInstanceOf[NamedExpression].name.toLowerCase).toSet ==
        spec.referencedColumns.map(_.toLowerCase).toSet
    case _ => false
  }
}

/** R5 — recognize the hand-written comparative sub-plan (the Figure 3 shape:
  * per-trend aggregates, a self-join on the grouping column with a `c1 < c2`
  * pair condition, and an outer `AGG(POWER(ABS(v1 − v2), p))` aggregate) and
  * replace it with Φ, so queries written without the extension still get the
  * COMPARE physical plan. Only the canonical deduplicated (`<`) form is
  * rewritten — the `!=` form has a different output shape (both directions).
  */
object ReduceToCompare extends Rule[LogicalPlan] {

  private def strip(e: Expression): Expression = e match {
    case a: Alias  => strip(a.child)
    case c: Cast   => strip(c.child)
    case other     => other
  }

  /** Match a trend-relation sub-aggregate: Aggregate([c, g], [c, g, AGG(m)]). */
  private case class TrendAgg(cOut: Attribute, gOut: Attribute, vOut: Attribute,
                              cName: String, gName: String, agg: AggKind, mName: String,
                              src: LogicalPlan)

  /** Unwrap pure-attribute (pass-through) projections the optimizer inserts
    * for column pruning.
    */
  private def stripProjects(plan: LogicalPlan): LogicalPlan = plan match {
    case Project(exprs, child) if exprs.forall(_.isInstanceOf[Attribute]) => stripProjects(child)
    case other => other
  }

  private def matchTrendAgg(plan: LogicalPlan): Option[TrendAgg] = stripProjects(plan) match {
    case Aggregate(groupExprs, aggExprs, src, _) if groupExprs.size == 2 && aggExprs.size == 3 =>
      val named = aggExprs.map(_.asInstanceOf[NamedExpression])
      val attrsOut = named.map(_.toAttribute)
      val (keyExprs, valExprs) = named.partition(e => !containsAggExpr(e))
      if (keyExprs.size != 2 || valExprs.size != 1) return None
      val keys = keyExprs.map(e => strip(e) match {
        case a: AttributeReference => Some((e.toAttribute, a.name))
        case _ => None
      })
      if (keys.exists(_.isEmpty)) return None
      val Seq((cOut, cName), (gOut, gName)) = keys.map(_.get)
      val (agg, mName) = strip(valExprs.head) match {
        case AggregateExpression(fn, _, false, _, _) =>
          val kind = fn match {
            case _: Average => AggKind.Avg
            case _: Sum     => AggKind.Sum
            case _: Min     => AggKind.Min
            case _: Max     => AggKind.Max
            case _          => return None
          }
          strip(fn.children.head) match {
            case m: AttributeReference => (kind, m.name)
            case _                     => return None
          }
        case _ => return None
      }
      Some(TrendAgg(cOut, gOut, valExprs.head.toAttribute, cName, gName, agg, mName, src))
    case _ => None
  }

  private def containsAggExpr(e: Expression): Boolean =
    e.exists(_.isInstanceOf[AggregateExpression])

  override def apply(plan: LogicalPlan): LogicalPlan = plan.transformUp {
    case outer @ Aggregate(groupExprs, aggExprs, joinPlan, _) if groupExprs.size == 2 =>
      (matchJoin(stripProjects(joinPlan)) match {
        case Some((left, right, gCond, cCond)) =>
          for {
            ta1 <- matchTrendAgg(left)
            ta2 <- matchTrendAgg(right)
            if ta1.src.canonicalized == ta2.src.canonicalized
            if ta1.gName == ta2.gName && ta1.cName == ta2.cName
            if ta1.agg == ta2.agg && ta1.mName == ta2.mName
            if isEq(gCond, ta1.gOut, ta2.gOut)
            if isLt(cCond, ta1.cOut, ta2.cOut)
            rewritten <- rewriteOuter(outer, ta1, ta2)
          } yield rewritten
        case None => None
      }).getOrElse(outer)
  }

  private def matchJoin(plan: LogicalPlan): Option[(LogicalPlan, LogicalPlan, Expression, Expression)] =
    plan match {
      case Join(l, r, Inner, Some(cond), _) =>
        val cs = cond match {
          case And(a, b) => Seq(a, b)
          case _         => return None
        }
        cs match {
          case Seq(a, b) if a.isInstanceOf[EqualTo] => Some((l, r, a, b))
          case Seq(a, b) if b.isInstanceOf[EqualTo] => Some((l, r, b, a))
          case _ => None
        }
      case _ => None
    }

  private def isEq(e: Expression, x: Attribute, y: Attribute): Boolean = e match {
    case EqualTo(a: AttributeReference, b: AttributeReference) =>
      (a.exprId == x.exprId && b.exprId == y.exprId) || (a.exprId == y.exprId && b.exprId == x.exprId)
    case _ => false
  }

  private def isLt(e: Expression, x: Attribute, y: Attribute): Boolean = e match {
    case LessThan(a: AttributeReference, b: AttributeReference) =>
      a.exprId == x.exprId && b.exprId == y.exprId
    case GreaterThan(a: AttributeReference, b: AttributeReference) =>
      a.exprId == y.exprId && b.exprId == x.exprId
    case _ => false
  }

  /** Validate the outer aggregate's shape and emit the replacement:
    * a Project (preserving the original output attrs) over CompareNode.
    */
  private def rewriteOuter(outer: Aggregate, ta1: TrendAgg, ta2: TrendAgg): Option[LogicalPlan] = {
    val groupIds = outer.groupingExpressions.map(strip).collect { case a: Attribute => a.exprId }
    if (groupIds.toSet != Set(ta1.cOut.exprId, ta2.cOut.exprId)) return None

    // Outer agg exprs: c1, c2 pass-throughs plus AGG(POWER(ABS(v1 - v2), p)).
    var scorer: Option[Scorer] = None
    val outCols = outer.aggregateExpressions.map { ne =>
      strip(ne) match {
        case a: AttributeReference if a.exprId == ta1.cOut.exprId => Some(("c1", ne))
        case a: AttributeReference if a.exprId == ta2.cOut.exprId => Some(("c2", ne))
        case AggregateExpression(fn, _, false, _, _) =>
          val kind = fn match {
            case _: Sum     => AggKind.Sum
            case _: Average => AggKind.Avg
            case _: Min     => AggKind.Min
            case _: Max     => AggKind.Max
            case _          => return None
          }
          strip(fn.children.head) match {
            case Pow(absExpr, pLit) =>
              val p = strip(pLit) match {
                case Literal(v: Double, _) if v.isWhole && v >= 1 => v.toInt
                case Literal(v: Int, _) if v >= 1                 => v
                case _                                            => return None
              }
              strip(absExpr) match {
                case Abs(sub, _) => strip(sub) match {
                  case Subtract(l, r, _) =>
                    val lId = strip(l) match { case a: AttributeReference => a.exprId; case _ => return None }
                    val rId = strip(r) match { case a: AttributeReference => a.exprId; case _ => return None }
                    if (lId == ta1.vOut.exprId && rId == ta2.vOut.exprId) {
                      scorer = Some(Scorer(kind, p)); Some(("score", ne))
                    } else return None
                  case _ => return None
                }
                case _ => return None
              }
            case _ => return None
          }
        case _ => return None
      }
    }
    if (outCols.exists(_.isEmpty) || scorer.isEmpty) return None

    val ts = TrendsetSpec(Seq(ConstraintTerm(ta1.cName, None)),
      Seq(GroupingMeasure(ta1.gName, ta1.agg, ta1.mName)))
    val spec = CompareSpec(ts, ts, scorer.get)
    val cmp = CompareNode(spec, None, ta1.src)
    val byName = cmp.output.map(a => a.name -> a).toMap

    // Rebuild the original output columns (names, types, exprIds preserved)
    // from COMPARE's string-typed output.
    val projections = outCols.flatten.map { case (role, orig) =>
      val origAttr = orig.toAttribute
      val srcAttr = role match {
        case "c1"    => byName(s"${ta1.cName}_1")
        case "c2"    => byName(s"${ta2.cName}_2")
        case "score" => byName("score")
      }
      val e: Expression =
        if (srcAttr.dataType == origAttr.dataType) srcAttr else Cast(srcAttr, origAttr.dataType)
      Alias(e, origAttr.name)(exprId = origAttr.exprId)
    }
    Some(Project(projections, cmp))
  }
}

/** R4 — commutativity of chained COMPAREs on the same partitioning attribute
  * (Table 3): execute the more selective comparison first. Chained COMPAREs
  * are a sequential filter pipeline over trends, so this is an ordering
  * decision; the estimator prefers the stage that retains the fewest trends.
  */
object CompareChain {
  /** Selectivity estimate of one stage: fraction of candidate trends its
    * top-k retains.
    */
  def selectivity(spec: CompareSpec, topK: TopK, trendCount: Long): Double = {
    val pairs = spec.pairMode match {
      case PairMode.SymmetricConstraint => trendCount.toDouble * (trendCount - 1) / 2
      case _                            => trendCount.toDouble
    }
    if (pairs <= 0) 1.0 else math.min(1.0, topK.k / pairs)
  }

  /** Order the stages most-selective first (ties keep original order). */
  def reorder(stages: Seq[(CompareSpec, TopK)], trendCount: Long): Seq[(CompareSpec, TopK)] =
    stages.sortBy { case (s, k) => selectivity(s, k, trendCount) }
}
