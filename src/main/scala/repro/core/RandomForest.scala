package repro.core

import org.apache.spark.sql.functions._
import scala.util.Random

final case class RFParams(
    nTrees: Int,
    sampleRate: Double = 0.1,
    featureRate: Double = 0.8,
    seed: Long = 7,
    tree: TreeParams = TreeParams(),
    treeParallelism: Int = 1,
)

/** Factorized random forest (paper §5.5.2): trees train in parallel over
  * row samples and feature subsets, without materializing R⋈.
  *
  * Row sampling uses the snowflake fast path: for a schema where the fact
  * table has N-to-1 paths to all other relations, sampling the fact table
  * uniformly IS uniform sampling of R⋈ (each fact row extends to exactly one
  * join result). The general ancestral sampler lives in [[Sampling]].
  */
final class RandomForest(
    graph0: JoinGraph,
    factName: String,
    features: Seq[Feature],
    params: RFParams,
    cacheMode: CacheMode = CacheMode.Shared,
    metrics: Metrics = new Metrics,
    sr: Semiring = VarianceSemiring,
) {
  private val cache = new MessageCache(cacheMode, metrics = metrics)

  def train(): ForestModel = {
    val trees = Scheduler.parMap(0 until params.nTrees, params.treeParallelism) { t =>
      // materialize the sample once (localCheckpoint): training queries then
      // scan ~sampleRate·|F| rows instead of re-filtering the full table,
      // and the sample is frozen (rand() is not re-evaluated per query)
      val sampled = graph0.rel(factName)
        .where(rand(params.seed + t) < params.sampleRate)
        .localCheckpoint(true)
      // distinct version per tree so sampled-fact messages don't collide in
      // the shared cache, while unchanged dimension messages stay shared
      var g = graph0.withRelation(factName, sampled)
      for (_ <- 0 to t) g = g.withRelation(factName, sampled)
      val feats = sampleFeatures(t)
      val mp = new MessagePassing(g, sr, cache, metrics)
      new FactorizedTreeTrainer(mp, feats, params.tree).train()
    }
    ForestModel(trees)
  }

  /** Deterministic per-tree feature bag over the canonically-ordered
    * feature list — the in-memory baseline uses the identical construction,
    * so both forests bag the same feature subsets.
    */
  private def sampleFeatures(t: Int): Seq[Feature] =
    RandomForest.featureBag(features, params.featureRate, params.seed, t)
}

object RandomForest {
  def featureBag(features: Seq[Feature], rate: Double, seed: Long, t: Int): Seq[Feature] = {
    val rnd = new Random(seed * 31 + t)
    val k   = math.max(1, math.ceil(features.size * rate).toInt)
    rnd.shuffle(features.sortBy(f => (f.relation, f.column)))
      .take(k).sortBy(f => (f.relation, f.column))
  }
}
