package repro.core

import scala.collection.mutable
import repro.ml._
import repro.proxy._

/** Evaluates candidate queries for the search (memoized by query identity).
  *
  *  - [[realLoss]]: the paper's expensive oracle — augment the training
  *    table with the candidate feature (base features + this one), train
  *    the downstream model on the train split, return the task loss on the
  *    validation split (Problem 1).
  *  - [[proxyScore]]: the low-cost proxy (MI / Spearman between the feature
  *    and the label on train+valid rows, or a fast LR model) used by the
  *    warm-up phase and QTI; higher is better.
  *
  * Feature columns are produced by Spark ([[FeatureQueryExecutor]]) and
  * memoized, so TPE re-proposals and the warm-up → generation hand-off
  * never recompute a query.
  */
final class Evaluator(
    val executor: FeatureQueryExecutor,
    val baseX: Array[Array[Double]],
    val y: Array[Double],
    val task: Task,
    val modelKind: ModelKind,
    val split: Splits.Split,
    val proxy: ProxyKind = MIProxy,
    val seed: Long = 7L,
    val fastModels: Boolean = true,
    /** Feature columns depend only on the query + dataset, so callers may
      * share one store across evaluators (model kinds, ablation variants)
      * to avoid re-running identical Spark queries.
      */
    featureStore: mutable.Map[String, Array[Double]] = mutable.HashMap.empty,
) {
  private val featureCache = featureStore
  private val lossCache = mutable.HashMap.empty[String, Double]
  private val proxyCache = mutable.HashMap.empty[String, Double]

  /** Number of Spark feature-query executions so far (for cost accounting). */
  def queryExecutions: Int = featureCache.size
  /** Number of real (model-training) evaluations so far. */
  def realEvaluations: Int = lossCache.size

  def feature(q: QuerySpec): Array[Double] =
    featureCache.getOrElseUpdate(q.cacheKey, executor.featureValues(q))

  /** Rows the proxy may look at: train + valid (never test). */
  private lazy val proxyRows: Array[Int] = split.train ++ split.valid

  def realLoss(q: QuerySpec): Double = lossCache.getOrElseUpdate(q.cacheKey, {
    val data = withFeature(feature(q))
    Models.splitLoss(modelKind, task, data, split.train, split.valid, seed, fastModels)
  })

  def proxyScore(q: QuerySpec): Double = proxyCache.getOrElseUpdate(q.cacheKey, {
    val f = feature(q)
    proxy match {
      case MIProxy =>
        Association.mutualInformation(proxyRows.map(f), proxyRows.map(y), task)
      case SCProxy =>
        Association.spearman(proxyRows.map(f), proxyRows.map(y))
      case LRProxy =>
        // Fast LR on base + candidate; score = negative validation loss.
        val data = withFeature(f)
        -Models.splitLoss(LRModel, task, data, split.train, split.valid, seed, fast = true)
    }
  })

  /** Base matrix with one extra feature column appended. */
  def withFeature(f: Array[Double]): DenseData =
    DenseData(baseX.indices.map(i => baseX(i) :+ f(i)).toArray, y)

  /** Base matrix with many extra feature columns appended. */
  def withFeatures(fs: Seq[Array[Double]]): DenseData =
    DenseData(baseX.indices.map(i => baseX(i) ++ fs.map(_(i))).toArray, y)
}
