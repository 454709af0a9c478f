package repro.core

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

/** Join utilities: semi-join-style predicate resolution on a fact table
  * (paper §4.1) and full-join materialization (for baselines / evaluation
  * only — the factorized paths never call [[materializeJoin]]).
  */
object Joins {

  /** Attach the feature columns of dimension relations onto `base`'s
    * DataFrame by joining along the (N-to-1) paths from `base`. Returns the
    * widened DataFrame and a resolver mapping each feature to its column
    * (attached columns are named `rel__col` to avoid collisions).
    *
    * This realizes the paper's semi-join predicate translation: a leaf
    * predicate over dimension attributes becomes directly evaluable on the
    * fact table. Dimension sides are broadcast (they are small by the
    * cluster's N-to-1 property).
    */
  def attachFeatures(
      graph: JoinGraph,
      base: String,
      features: Set[Feature],
      broadcastDims: Boolean = true,
  ): (DataFrame, Feature => Column) = {
    val needed = features.map(_.relation) - base
    // every relation on some base->target path, deduped, in BFS order
    val onPaths = scala.collection.mutable.LinkedHashSet.empty[String]
    needed.toSeq.sorted.foreach(t => graph.path(base, t).drop(1).foreach(onPaths.add))

    val featsByRel = features.groupBy(_.relation)
    var df = graph.rel(base)
    val attached = scala.collection.mutable.Map.empty[Feature, String]

    for (r <- onPaths) {
      val parent   = graph.path(base, r).takeRight(2).head
      val joinKeys = graph.keysBetween(parent, r)
      val childKeys = graph.neighbors(r)
        .filter(onPaths.contains)          // deeper relations still to join
        .flatMap(n => graph.keysBetween(r, n))
      val fcols = featsByRel.getOrElse(r, Set.empty).toSeq.sortBy(_.column)
      val sel = (joinKeys ++ childKeys).distinct.map(col) ++
        fcols.map(f => col(f.column).as(s"${r}__${f.column}"))
      fcols.foreach(f => attached(f) = s"${r}__${f.column}")
      val side0 = graph.rel(r).select(sel: _*)
      val side  = if (broadcastDims) broadcast(side0) else side0
      df = df.join(side, joinKeys, "inner")
    }

    val resolve: Feature => Column =
      f => col(attached.getOrElse(f, f.column))
    (df, resolve)
  }

  /** Materialize the full join R⋈ with every non-join-key column renamed to
    * `rel__col` (annotation columns dropped). Used by the single-table
    * baselines and for model evaluation at small scale.
    */
  def materializeJoin(graph: JoinGraph, annotationCols: Set[String] = Set.empty): DataFrame = {
    val keyCols = graph.edges.flatMap(_.keys).toSet
    def prepared(r: String): DataFrame = {
      val df = graph.rel(r)
      val sel = df.columns.toSeq.filterNot(annotationCols).map { c =>
        if (keyCols(c)) col(c) else col(c).as(s"${r}__$c")
      }
      df.select(sel: _*)
    }
    val root = graph.names.min
    def walk(cur: String, from: String, acc: DataFrame): DataFrame =
      graph.neighbors(cur).filter(_ != from).foldLeft(acc) { (a, n) =>
        walk(n, cur, a.join(prepared(n), graph.keysBetween(cur, n), "inner"))
      }
    walk(root, "", prepared(root))
  }

  /** Resolver for DataFrames produced by [[materializeJoin]]. */
  def wideResolve: Feature => Column = f => col(s"${f.relation}__${f.column}")

  /** Materialize R⋈ *with* its semiring annotations combined via ⊗ along
    * every join (paper eq. (2)) — i.e. the annotated wide table of Fig 1b.
    * Non-key, non-annotation columns are renamed to `rel__col`.
    */
  def materializeJoinAnnotated(graph: JoinGraph, sr: Semiring): DataFrame = {
    val keyCols = graph.edges.flatMap(_.keys).toSet
    def prepared(r: String): DataFrame = {
      val df = graph.rel(r)
      val sel = df.columns.toSeq.map { c =>
        if (keyCols(c) || sr.components.contains(c)) col(c) else col(c).as(s"${r}__$c")
      }
      df.select(sel: _*)
    }
    val root = graph.names.min
    def walk(cur: String, from: String, acc: DataFrame): DataFrame =
      graph.neighbors(cur).filter(_ != from).foldLeft(acc) { (a, n) =>
        walk(n, cur, Ann.multiplyJoin(a, prepared(n), graph.keysBetween(cur, n), sr))
      }
    walk(root, "", prepared(root))
  }
}
