package repro.core

import org.apache.spark.sql.DataFrame

/** Undirected edge of the join graph: `a ⋈ b` on equi-join `keys`. */
final case class Edge(a: String, b: String, keys: Seq[String]) {
  def touches(r: String): Boolean = a == r || b == r
  def other(r: String): String = if (r == a) b else a
}

/** An acyclic join graph of annotated relations (paper §3.1).
  *
  * Relations carry their semiring annotation columns. The graph is immutable;
  * residual updates produce a new graph via [[withRelation]], bumping the
  * relation's version so message-cache keys referencing it are invalidated.
  *
  * Cyclic join graphs must be pre-joined into acyclic ones by the caller
  * (standard hypertree decomposition, paper footnote 1).
  */
final class JoinGraph private (
    val relations: Map[String, DataFrame],
    val edges: Seq[Edge],
    val versions: Map[String, Long],
) extends Serializable {

  val names: Set[String] = relations.keySet
  require(edges.forall(e => names(e.a) && names(e.b)), "edge references unknown relation")
  require(edges.size == names.size - 1, s"join graph must be a tree: ${names.size} relations need ${names.size - 1} edges, got ${edges.size}")

  /** relation -> (neighbor, join keys) */
  val adjacency: Map[String, Seq[(String, Seq[String])]] = {
    val pairs = edges.flatMap(e => Seq(e.a -> (e.b, e.keys), e.b -> (e.a, e.keys)))
    pairs.groupBy(_._1).map { case (k, vs) => k -> vs.map(_._2) }
      .withDefaultValue(Seq.empty)
  }

  // connectivity check (tree = n-1 edges + connected)
  require(reachableFrom(names.head).size == names.size, "join graph is not connected")

  def rel(name: String): DataFrame = relations(name)

  def neighbors(r: String): Seq[String] = adjacency(r).map(_._1)

  def keysBetween(u: String, v: String): Seq[String] =
    adjacency(u).collectFirst { case (`v`, ks) => ks }
      .getOrElse(sys.error(s"no edge between $u and $v"))

  /** All relations on `child`'s side of the (child, parent) edge. */
  def subtree(child: String, parent: String): Set[String] = {
    def walk(cur: String, from: String, acc: Set[String]): Set[String] =
      neighbors(cur).filter(n => n != from && !acc(n))
        .foldLeft(acc + cur)((a, n) => walk(n, cur, a))
    walk(child, parent, Set.empty)
  }

  /** Unique path from `from` to `to` (inclusive). */
  def path(from: String, to: String): Seq[String] = {
    def dfs(cur: String, prev: String, acc: List[String]): Option[List[String]] =
      if (cur == to) Some((cur :: acc).reverse)
      else neighbors(cur).filter(_ != prev).view
        .flatMap(n => dfs(n, cur, cur :: acc)).headOption
    dfs(from, "", Nil).getOrElse(sys.error(s"no path $from -> $to"))
  }

  def withRelation(name: String, df: DataFrame): JoinGraph = {
    require(names(name), s"unknown relation $name")
    new JoinGraph(relations.updated(name, df), edges, versions.updated(name, versions(name) + 1))
  }

  def version(name: String): Long = versions(name)

  private def reachableFrom(start: String): Set[String] = {
    def walk(cur: String, acc: Set[String]): Set[String] =
      neighbors(cur).filterNot(acc).foldLeft(acc + cur)((a, n) => walk(n, a))
    walk(start, Set.empty)
  }
}

object JoinGraph {
  def apply(relations: Map[String, DataFrame], edges: Seq[Edge]): JoinGraph =
    new JoinGraph(relations, edges, relations.keys.map(_ -> 0L).toMap)

  /** Single-relation graph — used for trainers over a materialized wide
    * table and for the histogram cuboid.
    */
  def single(name: String, df: DataFrame): JoinGraph =
    apply(Map(name -> df), Seq.empty)
}
