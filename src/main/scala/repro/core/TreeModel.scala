package repro.core

import org.apache.spark.sql.Column
import org.apache.spark.sql.functions._

/** Trained decision tree. Internal nodes hold (feature, split point); left
  * branch is `feature <= v` (numeric) or `feature = v` (categorical), right
  * is the negation — mutually exclusive and collectively exhaustive, as
  * required for residual updates (paper §3.2/§4).
  */
sealed trait TNode extends Serializable {
  def numLeaves: Int
  def depth: Int
}

final case class TLeaf(prediction: Double, count: Double) extends TNode {
  def numLeaves = 1
  def depth     = 0
}

final case class TSplit(feature: Feature, value: SplitValue, left: TNode, right: TNode) extends TNode {
  def numLeaves: Int = left.numLeaves + right.numLeaves
  def depth: Int     = 1 + math.max(left.depth, right.depth)
}

final case class TreeModel(root: TNode) {
  def numLeaves: Int = root.numLeaves
  def depth: Int     = root.depth

  def featuresUsed: Set[Feature] = {
    def walk(n: TNode): Set[Feature] = n match {
      case _: TLeaf            => Set.empty
      case TSplit(f, _, l, r)  => walk(l) ++ walk(r) + f
    }
    walk(root)
  }

  /** Every leaf with its root-to-leaf predicate path. */
  def leaves: Seq[(TLeaf, List[(Feature, Predicate)])] = {
    def walk(n: TNode, path: List[(Feature, Predicate)]): Seq[(TLeaf, List[(Feature, Predicate)])] =
      n match {
        case l: TLeaf => Seq((l, path.reverse))
        case TSplit(f, v, lt, rt) =>
          val (pl, pr) = Predicate.forSplit(f, v)
          walk(lt, (f, pl) :: path) ++ walk(rt, (f, pr) :: path)
      }
    walk(root, Nil)
  }

  /** Prediction as a nested CASE WHEN column expression; `resolve` maps a
    * feature to the column holding its value in the target DataFrame. The
    * expression is exhaustive (nulls fall through to the right branch).
    */
  def predictExpr(resolve: Feature => Column): Column = {
    def walk(n: TNode): Column = n match {
      case TLeaf(p, _) => lit(p)
      case TSplit(f, v, l, r) =>
        val cond = v match {
          case NumThreshold(t) => resolve(f).cast("double") <= t
          case CatValue(c)     => resolve(f).cast("string") === c
        }
        when(cond, walk(l)).otherwise(walk(r))
    }
    walk(root)
  }

  /** Driver-side prediction; `resolve` maps a feature to its value
    * (numeric as Double, categorical as String).
    */
  def predict(resolve: Feature => Any): Double = {
    @annotation.tailrec
    def walk(n: TNode): Double = n match {
      case TLeaf(p, _) => p
      case TSplit(f, v, l, r) =>
        val goLeft = v match {
          case NumThreshold(t) => resolve(f).asInstanceOf[Double] <= t
          case CatValue(c)     => resolve(f).asInstanceOf[String] == c
        }
        walk(if (goLeft) l else r)
    }
    walk(root)
  }

  /** Human-readable rendering for debugging / structural assertions. */
  def render: String = {
    def walk(n: TNode, indent: String): String = n match {
      case TLeaf(p, c) => f"${indent}leaf p=$p%.6f n=$c%.1f\n"
      case TSplit(f, v, l, r) =>
        s"$indent$f ${v.render}\n" + walk(l, indent + "  ") + walk(r, indent + "  ")
    }
    walk(root, "")
  }
}

/** A boosted ensemble: base score + lr-scaled trees (paper §4); also used
  * (with base 0 and averaging) for random forests.
  */
final case class BoostedModel(baseScore: Double, learningRate: Double, trees: Seq[TreeModel]) {
  def predictExpr(resolve: Feature => Column): Column =
    trees.foldLeft(lit(baseScore))((acc, t) => acc + t.predictExpr(resolve) * learningRate)
  def predict(resolve: Feature => Any): Double =
    baseScore + trees.map(_.predict(resolve)).sum * learningRate
}

final case class ForestModel(trees: Seq[TreeModel]) {
  def predictExpr(resolve: Feature => Column): Column =
    trees.map(_.predictExpr(resolve)).reduce(_ + _) / trees.size
  def predict(resolve: Feature => Any): Double =
    trees.map(_.predict(resolve)).sum / trees.size
}
