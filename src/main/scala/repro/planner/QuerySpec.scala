package repro.planner

import org.apache.spark.sql.{Column, functions => F}
import repro.core.Tokenizer

/** Predicate algebra of a Dedupe query's WHERE clause (paper §5 supports
  * conjunctive/disjunctive conditions of the form `E.x op constant` and
  * equi-joins). `literalTokens` exposes the blocking keys the cost-based
  * planner derives from literals (paper §7.2.1.i); predicates with no
  * string literal (ranges, MOD) report none and the estimator falls back
  * to evaluating the filter.
  */
sealed trait Pred {
  def toColumn: Column
  def literalTokens: Seq[String]
}

case object TruePred extends Pred {
  def toColumn: Column            = F.lit(true)
  def literalTokens: Seq[String]  = Nil
}

/** `attr = 'value'` */
final case class EqPred(attr: String, value: String) extends Pred {
  def toColumn: Column           = F.col(attr).cast("string") === value
  def literalTokens: Seq[String] = Tokenizer.tokensOf(value)
}

/** `attr IN ('v1', 'v2', …)` */
final case class InPred(attr: String, values: Seq[String]) extends Pred {
  def toColumn: Column           = F.col(attr).cast("string").isin(values: _*)
  def literalTokens: Seq[String] = values.flatMap(Tokenizer.tokensOf).distinct
}

/** Numeric comparison `attr op value`; op ∈ {<, <=, >, >=}. Uses
  * `try_cast` so corrupted (non-numeric) duplicate values simply fail the
  * filter instead of failing the query under ANSI mode.
  */
final case class CmpPred(attr: String, op: String, value: Double) extends Pred {
  def toColumn: Column = {
    val c = F.expr(s"try_cast(`$attr` AS DOUBLE)")
    op match {
      case "<"  => c < value
      case "<=" => c <= value
      case ">"  => c > value
      case ">=" => c >= value
      case _    => throw new IllegalArgumentException(s"unsupported op $op")
    }
  }
  def literalTokens: Seq[String] = Nil
}

/** Inclusive numeric range `lo <= attr <= hi` (try_cast: see CmpPred). */
final case class RangePred(attr: String, lo: Double, hi: Double) extends Pred {
  def toColumn: Column           = F.expr(s"try_cast(`$attr` AS DOUBLE)").between(lo, hi)
  def literalTokens: Seq[String] = Nil
}

/** `MOD(eid, m) < k` — the paper's Q9 random-selection query. */
final case class ModLtPred(m: Long, k: Long) extends Pred {
  def toColumn: Column           = F.pmod(F.col(Tokenizer.EidCol), F.lit(m)) < k
  def literalTokens: Seq[String] = Nil
}

final case class AndPred(l: Pred, r: Pred) extends Pred {
  def toColumn: Column           = l.toColumn && r.toColumn
  def literalTokens: Seq[String] = (l.literalTokens ++ r.literalTokens).distinct
}

final case class OrPred(l: Pred, r: Pred) extends Pred {
  def toColumn: Column           = l.toColumn || r.toColumn
  def literalTokens: Seq[String] = (l.literalTokens ++ r.literalTokens).distinct
}

/** A single-table SP dedupe query: σ_pred(table) with a projection over
  * the grouped output (empty projection = all attributes).
  */
final case class SelectSpec(table: String, pred: Pred = TruePred, projection: Seq[String] = Nil)

/** A two-table SPJ dedupe query: σ(left) ⋈_{leftAttr = rightAttr} σ(right).
  * Projection entries are (table, attribute) pairs over the grouped join
  * output (empty = all).
  */
final case class JoinSpec(
    left: SelectSpec,
    right: SelectSpec,
    leftAttr: String,
    rightAttr: String,
    projection: Seq[(String, String)] = Nil,
)
