package repro.core

import org.apache.spark.sql.Column
import org.apache.spark.sql.functions.col

/** Feature kind: numeric features split on `<= v` / `> v`, categorical on
  * `= v` / `<> v` (paper §3.2).
  */
sealed trait FeatureKind
case object NumericF     extends FeatureKind
case object CategoricalF extends FeatureKind

/** A training feature: a column of a relation in the join graph. */
final case class Feature(relation: String, column: String, kind: FeatureKind = NumericF) {
  override def toString: String = s"$relation.$column"
}

/** A split predicate over a single column of a single relation. `sig` is the
  * canonical form used in message-cache keys.
  */
sealed trait Predicate extends Serializable {
  def column: String
  def toCol: Column
  def sig: String
  def negate: Predicate
}

final case class Le(column: String, v: Double) extends Predicate {
  def toCol: Column     = col(column) <= v
  def sig: String       = s"$column<=$v"
  def negate: Predicate = Gt(column, v)
}

final case class Gt(column: String, v: Double) extends Predicate {
  def toCol: Column     = col(column) > v
  def sig: String       = s"$column>$v"
  def negate: Predicate = Le(column, v)
}

final case class CatEq(column: String, v: String) extends Predicate {
  def toCol: Column     = col(column) === v
  def sig: String       = s"$column=$v"
  def negate: Predicate = CatNe(column, v)
}

final case class CatNe(column: String, v: String) extends Predicate {
  def toCol: Column     = col(column) =!= v
  def sig: String       = s"$column!=$v"
  def negate: Predicate = CatEq(column, v)
}

object Predicate {
  /** Predicate for "feature goes left at (threshold)" and its negation. */
  def forSplit(f: Feature, threshold: SplitValue): (Predicate, Predicate) = threshold match {
    case NumThreshold(v) => (Le(f.column, v), Gt(f.column, v))
    case CatValue(v)     => (CatEq(f.column, v), CatNe(f.column, v))
  }
}

/** Split point: numeric threshold (left = `<= v`) or categorical one-vs-rest
  * value (left = `= v`).
  */
sealed trait SplitValue extends Serializable { def render: String }
final case class NumThreshold(v: Double) extends SplitValue { def render = s"<=$v" }
final case class CatValue(v: String)     extends SplitValue { def render = s"=$v"  }

/** Per-relation predicate sets describing a tree node's partition of R⋈. */
object PredMap {
  type T = Map[String, List[Predicate]]
  val empty: T = Map.empty

  def add(m: T, relation: String, p: Predicate): T =
    m.updated(relation, p :: m.getOrElse(relation, Nil))

  /** Canonical signature of the predicates on `relation` (order-free). */
  def sig(m: T, relation: String): String =
    m.getOrElse(relation, Nil).map(_.sig).sorted.mkString(",")
}
