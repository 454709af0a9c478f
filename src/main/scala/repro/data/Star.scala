package repro.data

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core._

/** A prepared training dataset: raw (un-annotated) relations + join graph
  * metadata. `Boosting.prepare` lifts it into an annotated [[JoinGraph]].
  */
final case class Dataset(
    relations: Map[String, DataFrame],
    edges: Seq[Edge],
    yRelation: String,
    yCol: String,
    features: Seq[Feature],
    clusters: Seq[Cluster],
) {
  def annotated(sr: Semiring = VarianceSemiring): JoinGraph =
    Boosting.prepare(relations, edges, yRelation, yCol, sr)

  /** Materialize every base relation in memory with truncated lineage
    * (experiments start from warm data; short plans keep the per-query
    * Catalyst planning cost of the many small training queries down).
    */
  def persist(): Dataset =
    copy(relations = relations.map { case (n, df) => n -> df.localCheckpoint(true) })
}

/** Favorita-style star schema (paper Fig 7 + §6 preprocessing): fact table
  * `sales` with N-to-1 edges to 5 dimensions. Following the paper's own
  * preprocessing, every dimension contributes one imputed integer feature in
  * [1, 1000] and the target is the published deterministic transform of
  * those features (footnote 7) plus noise. All columns are deterministic in
  * (row id, seed) via xxhash64, so regeneration is exactly reproducible.
  *
  * The same generator doubles as the TPC-DS-lite stand-in: scaling the fact
  * row count plays the role of the TPC-DS scale factor, and
  * `extraFeaturesPerDim` scales the feature count (paper Figs 10/11).
  */
object Star {

  final case class Config(
      nFact: Long,
      dimRows: Int = 1000,
      extraFeaturesPerDim: Int = 0,
      extraFactCols: Int = 0,
      includeCategorical: Boolean = true,
      seed: Long = 42,
      noiseAmp: Double = 50.0,
  )

  val dims: Seq[(String, String, String)] = Seq(
    // (relation, key, feature)
    ("dates", "date_id", "f_dates"),
    ("stores", "store_id", "f_stores"),
    ("items", "item_id", "f_items"),
    ("transactions", "trans_id", "f_trans"),
    ("oil", "oil_id", "f_oil"),
  )

  /** Deterministic int feature in [1,1000] derived from a key column. */
  private def feat(tag: String, key: Column, seed: Long): Column =
    (pmod(xxhash64(lit(tag), key, lit(seed)), lit(1000)) + 1).cast("int")

  def generate(spark: SparkSession, cfg: Config): Dataset = {
    val dimDfs: Map[String, DataFrame] = dims.map { case (rel, key, fcol) =>
      var df = spark.range(1, cfg.dimRows + 1L).select(col("id").cast("long").as(key))
      df = df.withColumn(fcol, feat(s"$rel.$fcol", col(key), cfg.seed))
      for (i <- 1 to cfg.extraFeaturesPerDim)
        df = df.withColumn(s"${fcol}_x$i", feat(s"$rel.${fcol}_x$i", col(key), cfg.seed))
      rel -> df
    }.toMap

    var fact = spark.range(cfg.nFact).select(col("id").cast("long").as("sid"))
    for ((rel, key, _) <- dims)
      fact = fact.withColumn(key,
        (pmod(xxhash64(lit(s"key.$rel"), col("sid"), lit(cfg.seed)), lit(cfg.dimRows.toLong)) + 1).cast("long"))
    fact = fact.withColumn("f_sales", feat("sales.f_sales", col("sid"), cfg.seed))
    if (cfg.includeCategorical)
      fact = fact.withColumn("f_promo",
        element_at(
          array(lit("yes"), lit("no"), lit("maybe")),
          (pmod(xxhash64(lit("sales.f_promo"), col("sid"), lit(cfg.seed)), lit(3)) + 1).cast("int"),
        ))
    for (i <- 1 to cfg.extraFactCols)
      fact = fact.withColumn(s"payload_$i",
        (pmod(xxhash64(lit(s"sales.payload_$i"), col("sid"), lit(cfg.seed)), lit(100000)) / lit(100.0)))

    // the paper's imputed target (footnote 7), evaluated through the same
    // deterministic per-key feature functions so no join is needed here
    def dimFeat(rel: String, key: String, fcol: String): Column =
      feat(s"$rel.$fcol", col(key), cfg.seed).cast("double")
    val fItems  = dimFeat("items", "item_id", "f_items")
    val fOil    = dimFeat("oil", "oil_id", "f_oil")
    val fDates  = dimFeat("dates", "date_id", "f_dates")
    val fStores = dimFeat("stores", "store_id", "f_stores")
    val fTrans  = dimFeat("transactions", "trans_id", "f_trans")
    val noise = (pmod(xxhash64(col("sid"), lit(cfg.seed + 777)), lit(10000L)).cast("double") / 10000.0 - 0.5) * cfg.noiseAmp
    var y = fItems * log(fItems) + log(fOil) - lit(10.0) * fDates - lit(10.0) * fStores + fTrans * fTrans +
      lit(0.5) * col("f_sales").cast("double") + noise
    if (cfg.includeCategorical)
      y = y + when(col("f_promo") === "yes", 500.0).when(col("f_promo") === "no", -500.0).otherwise(0.0)
    fact = fact.withColumn("y", y)

    val features =
      dims.map { case (rel, _, fcol) => Feature(rel, fcol) } ++
        (for ((rel, _, fcol) <- dims; i <- 1 to cfg.extraFeaturesPerDim) yield Feature(rel, s"${fcol}_x$i")) ++
        Seq(Feature("sales", "f_sales")) ++
        (if (cfg.includeCategorical) Seq(Feature("sales", "f_promo", CategoricalF)) else Seq.empty)

    val edges = dims.map { case (rel, key, _) => Edge("sales", rel, Seq(key)) }
    val allRels = dimDfs + ("sales" -> fact)
    Dataset(
      relations = allRels,
      edges = edges,
      yRelation = "sales",
      yCol = "y",
      features = features,
      clusters = Seq(Cluster("sales", allRels.keySet)),
    )
  }
}
