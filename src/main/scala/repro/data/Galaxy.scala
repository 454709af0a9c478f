package repro.data

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core._

/** IMDB-style galaxy schema (paper Fig 3): two entity tables (`person`,
  * `movie`), two 1-N info tables hanging off them, and the M-N bridge
  * `cast_info` carrying the target. The full join R⋈ blows up by roughly
  * `infoPerPerson × infoPerMovie` over `cast_info` — the property that makes
  * single-table training prohibitive and CPT necessary.
  *
  * Clusters (each a fact table + N-to-1 members):
  *   cast   = {cast_info, person, movie}
  *   person = {person_info, person}
  *   movie  = {movie_info, movie}
  */
object Galaxy {

  final case class Config(
      nPerson: Long = 1000,
      nMovie: Long = 1000,
      nCast: Long = 10000,
      infoPerPerson: Int = 4,
      infoPerMovie: Int = 4,
      seed: Long = 99,
      noiseAmp: Double = 10.0,
  )

  private def feat(tag: String, key: Column, seed: Long): Column =
    (pmod(xxhash64(lit(tag), key, lit(seed)), lit(1000)) + 1).cast("int")

  def generate(spark: SparkSession, cfg: Config): Dataset = {
    val person = spark.range(1, cfg.nPerson + 1).select(col("id").as("p_id"))
      .withColumn("p_f", feat("person.p_f", col("p_id"), cfg.seed))
    val movie = spark.range(1, cfg.nMovie + 1).select(col("id").as("m_id"))
      .withColumn("m_f", feat("movie.m_f", col("m_id"), cfg.seed))

    // info features correlate with their entity's feature (so CPT trees that
    // split on info attributes are predictive of y)
    val personInfo = spark.range(cfg.nPerson * cfg.infoPerPerson).select(
      col("id").as("pi_id"),
      (col("id") / cfg.infoPerPerson).cast("long") + 1 as "p_id",
    ).withColumn("pi_f",
      feat("person.p_f", col("p_id"), cfg.seed) +
        (pmod(xxhash64(lit("pi.off"), col("pi_id"), lit(cfg.seed)), lit(21)) - 10).cast("int"))

    val movieInfo = spark.range(cfg.nMovie * cfg.infoPerMovie).select(
      col("id").as("mi_id"),
      (col("id") / cfg.infoPerMovie).cast("long") + 1 as "m_id",
    ).withColumn("mi_f",
      feat("movie.m_f", col("m_id"), cfg.seed) +
        (pmod(xxhash64(lit("mi.off"), col("mi_id"), lit(cfg.seed)), lit(21)) - 10).cast("int"))

    val noise = (pmod(xxhash64(col("ci_id"), lit(cfg.seed + 5)), lit(10000L)).cast("double") / 10000.0 - 0.5) * cfg.noiseAmp
    val castInfo = spark.range(cfg.nCast).select(
      col("id").as("ci_id"),
      (pmod(xxhash64(lit("cast.p"), col("id"), lit(cfg.seed)), lit(cfg.nPerson)) + 1).as("p_id"),
      (pmod(xxhash64(lit("cast.m"), col("id"), lit(cfg.seed)), lit(cfg.nMovie)) + 1).as("m_id"),
    ).withColumn("ci_f", feat("cast.ci_f", col("ci_id"), cfg.seed))
      .withColumn("y",
        lit(2.0) * feat("person.p_f", col("p_id"), cfg.seed) +
          lit(3.0) * feat("movie.m_f", col("m_id"), cfg.seed) +
          col("ci_f").cast("double") + noise)

    Dataset(
      relations = Map(
        "person" -> person, "movie" -> movie,
        "person_info" -> personInfo, "movie_info" -> movieInfo,
        "cast_info" -> castInfo,
      ),
      edges = Seq(
        Edge("cast_info", "person", Seq("p_id")),
        Edge("cast_info", "movie", Seq("m_id")),
        Edge("person", "person_info", Seq("p_id")),
        Edge("movie", "movie_info", Seq("m_id")),
      ),
      yRelation = "cast_info",
      yCol = "y",
      features = Seq(
        Feature("person", "p_f"),
        Feature("movie", "m_f"),
        Feature("cast_info", "ci_f"),
        Feature("person_info", "pi_f"),
        Feature("movie_info", "mi_f"),
      ),
      clusters = Seq(
        Cluster("cast_info", Set("cast_info", "person", "movie")),
        Cluster("person_info", Set("person_info", "person")),
        Cluster("movie_info", Set("movie_info", "movie")),
      ),
    )
  }
}
