package repro.core

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import repro.datalog._

/** Compiles a single Datalog rule body into a Catalyst (DataFrame) plan —
  * the paper's "query generator" (§4), which turns each rule into SQL:
  * positive atoms become a join chain, comparisons become filters, negated
  * atoms become anti-joins, and the head becomes a projection (or a
  * group-by + aggregate for aggregated heads).
  *
  * Relations are supplied by a [[PlanGenerator.Resolver]] so the engine can
  * substitute Δ-relations at chosen atom occurrences (semi-naïve rewriting)
  * and wrap small relations in `broadcast` hints (OOF's build-side choice).
  */
object PlanGenerator {

  /** Supplies the DataFrame for the `i`-th atom occurrence in the body
    * (positive atoms first, in order, then negated atoms).
    */
  type Resolver = (BAtom, Int) => DataFrame

  final case class CompileException(msg: String) extends RuntimeException(msg)

  /** Compile `rule` to a DataFrame whose columns are c0..c{arity-1}.
    *
    * For heads with aggregate terms the per-rule aggregation is applied
    * (group-by the plain head terms, aggregate the rest) — callers doing
    * recursive MIN/MAX still merge these partial aggregates across rules
    * and iterations, which is sound because MIN/MAX are idempotent and
    * associative.
    */
  def compileRule(rule: Rule, resolve: Resolver): DataFrame = {
    val positives = rule.positiveAtoms
    if (positives.isEmpty) return compileFact(rule, resolve)

    // --- join chain over positive atoms -----------------------------------
    var varCol = Map.empty[String, String] // variable -> bound column name
    var cur: DataFrame = null
    positives.zipWithIndex.foreach { case (atom, k) =>
      val (df, bound) = atomFrame(atom, k, resolve)
      if (cur == null) {
        cur = df
        varCol ++= bound
      } else {
        val shared = bound.keySet.intersect(varCol.keySet)
        val joined =
          if (shared.isEmpty) cur.crossJoin(df)
          else {
            val cond = shared.toSeq.sorted
              .map(v => col(varCol(v)) === col(bound(v)))
              .reduce(_ && _)
            cur.join(df, cond, "inner")
          }
        cur = joined
        varCol ++= (bound -- varCol.keySet)
      }
    }

    // --- comparison filters ------------------------------------------------
    rule.comparisons.foreach { c =>
      cur = cur.filter(cmpColumn(c, varCol))
    }

    // --- negated atoms as anti-joins ---------------------------------------
    rule.negatedAtoms.zipWithIndex.foreach { case (atom, j) =>
      val occ = positives.size + j
      val neg = prefixed(resolve(atom, occ), s"n${occ}_")
      val conds = atom.terms.zipWithIndex.map {
        case (Var(v), i) => col(varCol(v)) === neg(s"n${occ}_c$i")
        case (Num(c), i) => neg(s"n${occ}_c$i") === lit(c)
      }
      cur = cur.join(neg, conds.reduce(_ && _), "left_anti")
    }

    projectHead(rule.head, cur, varCol)
  }

  /** A ground fact rule (empty body): a single constant row. */
  private def compileFact(rule: Rule, resolve: Resolver): DataFrame = {
    require(rule.negatedAtoms.isEmpty && rule.comparisons.isEmpty,
      s"fact rule must have an empty body: $rule")
    val spark = org.apache.spark.sql.SparkSession.active
    val cols = rule.head.terms.zipWithIndex.map {
      case (HExpr(ELit(v)), i) => lit(v).cast("long").as(s"c$i")
      case (t, _) => throw CompileException(s"fact head must be ground, got $t in $rule")
    }
    spark.range(1).select(cols: _*)
  }

  /** Rename atom columns to a unique prefix, apply intra-atom constant and
    * repeated-variable constraints, and report variable -> column bindings.
    */
  private def atomFrame(atom: BAtom, k: Int, resolve: Resolver): (DataFrame, Map[String, String]) = {
    var df = prefixed(resolve(atom, k), s"a${k}_")
    var bound = Map.empty[String, String]
    atom.terms.zipWithIndex.foreach {
      case (Num(v), i) => df = df.filter(col(s"a${k}_c$i") === lit(v))
      case (Var(n), i) =>
        bound.get(n) match {
          case Some(c) => df = df.filter(col(c) === col(s"a${k}_c$i"))
          case None    => bound += n -> s"a${k}_c$i"
        }
    }
    (df, bound)
  }

  /** Rename c0..cN to `<prefix>c0..` (fresh attribute ids — safe self-joins). */
  private def prefixed(df: DataFrame, prefix: String): DataFrame =
    df.select(df.columns.zipWithIndex.map { case (c, i) => col(c).as(s"${prefix}c$i") }.toIndexedSeq: _*)

  private def exprColumn(e: Expr, varCol: Map[String, String]): Column = e match {
    case EVar(n) => col(varCol.getOrElse(n,
      throw CompileException(s"variable '$n' not bound by a positive atom")))
    case ELit(v)    => lit(v).cast("long")
    case EAdd(l, r) => exprColumn(l, varCol) + exprColumn(r, varCol)
    case ESub(l, r) => exprColumn(l, varCol) - exprColumn(r, varCol)
    case EMul(l, r) => exprColumn(l, varCol) * exprColumn(r, varCol)
  }

  private def cmpColumn(c: BCmp, varCol: Map[String, String]): Column = {
    val l = exprColumn(c.l, varCol)
    val r = exprColumn(c.r, varCol)
    c.op match {
      case CmpOp.Eq => l === r
      case CmpOp.Ne => l =!= r
      case CmpOp.Lt => l < r
      case CmpOp.Le => l <= r
      case CmpOp.Gt => l > r
      case CmpOp.Ge => l >= r
    }
  }

  /** Project (or group-aggregate) the joined bindings into head columns. */
  private def projectHead(head: Head, bindings: DataFrame, varCol: Map[String, String]): DataFrame = {
    if (!head.hasAgg) {
      val cols = head.terms.zipWithIndex.map {
        case (HExpr(e), i)   => exprColumn(e, varCol).cast("long").as(s"c$i")
        case (HAgg(_, _), _) => throw CompileException("unreachable")
      }
      bindings.select(cols: _*)
    } else {
      val keyCols = head.terms.zipWithIndex.collect {
        case (HExpr(e), i) => exprColumn(e, varCol).cast("long").as(s"c$i")
      }
      val aggCols = head.terms.zipWithIndex.collect {
        case (HAgg(op, e), i) =>
          val c = exprColumn(e, varCol)
          val agg = op match {
            case AggOp.Min   => min(c)
            case AggOp.Max   => max(c)
            case AggOp.Sum   => sum(c)
            case AggOp.Count => count(c)
            case AggOp.Avg   => floor(avg(c)) // integer semantics throughout
          }
          agg.cast("long").as(s"c$i")
      }
      val grouped =
        if (keyCols.isEmpty) bindings.agg(aggCols.head, aggCols.tail: _*)
        else bindings.groupBy(keyCols: _*).agg(aggCols.head, aggCols.tail: _*)
      grouped.select(head.terms.indices.map(i => col(s"c$i")): _*)
    }
  }
}
