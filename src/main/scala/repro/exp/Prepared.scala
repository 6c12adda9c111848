package repro.exp

import scala.collection.mutable
import org.apache.spark.sql.functions.col
import repro.baselines.{CandidateFeature, Featuretools}
import repro.core._
import repro.data.TaskDef
import repro.ml._
import repro.proxy.ProxyKind

/** One dataset prepared for experiments: training rows collected once
  * (keys / base features / label all from the same collect, so alignment
  * is guaranteed), predicate domains extracted, Spark executor ready, and
  * a feature store shared across every method and model so identical
  * queries are never re-executed.
  */
final class Prepared(val td: TaskDef, val budget: SearchBudget, splitSeed: Long = 42L) {

  private val rows =
    td.train.select((td.keys ++ td.baseFeatures :+ td.label).map(col): _*).collect()
  require(rows.nonEmpty, s"${td.name}: empty training table")

  val keyRows: Array[Vector[String]] =
    rows.map(r => Vector.tabulate(td.keys.size)(i => String.valueOf(r.get(i))))
  val baseX: Array[Array[Double]] =
    rows.map(r => Array.tabulate(td.baseFeatures.size)(j => num(r.get(td.keys.size + j))))
  val y: Array[Double] = rows.map(r => num(r.get(td.keys.size + td.baseFeatures.size)))

  val split: Splits.Split = Splits.threeWay(rows.length, splitSeed)
  val executor = new FeatureQueryExecutor(td.train, td.relevant, td.keys, Some(keyRows))
  val domains: Map[String, AttrDomain] =
    SearchSpace.domains(td.relevant, td.predAttrs, budget.maxCats, budget.numQuantiles)
  val featureStore: mutable.Map[String, Array[Double]] = mutable.HashMap.empty

  def template(p: Vector[String]): QueryTemplate = QueryTemplate(td.aggFuncs, td.aggAttrs, p, td.keys)
  def codec(p: Vector[String]): QueryVectorCodec = new QueryVectorCodec(template(p), domains)

  def evaluator(modelKind: ModelKind, proxy: ProxyKind, seed: Long): Evaluator =
    new Evaluator(executor, baseX, y, td.task, modelKind, split, proxy, seed,
      fastModels = true, featureStore = featureStore)

  /** The full Featuretools candidate pool (predicate-free agg queries). */
  lazy val ftCandidates: Vector[CandidateFeature] =
    Featuretools.candidateSpecs(template(Vector.empty)).map { q =>
      CandidateFeature(s"${q.agg.name}_${q.aggAttr}", q,
        featureStore.getOrElseUpdate(q.cacheKey, executor.featureValues(q)))
    }

  /** Direct-join candidates (each relevant column as-is, via a one-to-one
    * AVG aggregate) for the ARDA / AutoFeature baselines.
    */
  lazy val directCandidates: Vector[CandidateFeature] =
    td.directJoinAttrs.map { a =>
      val q = QuerySpec(AggFunc.Avg, a, Vector.empty, td.keys)
      CandidateFeature(s"direct_$a", q,
        featureStore.getOrElseUpdate(q.cacheKey, executor.featureValues(q)))
    }

  /** Materialize a query's feature through the shared store. */
  def feature(q: QuerySpec): Array[Double] =
    featureStore.getOrElseUpdate(q.cacheKey, executor.featureValues(q))

  /** Test-split metric of the full-budget model over base + features.
    * (Search never sees the test split.)
    */
  def finalMetric(modelKind: ModelKind, features: Seq[Array[Double]], seed: Long = 7L): Double = {
    val data = DenseData(baseX.indices.map(i => baseX(i) ++ features.map(_(i))).toArray, y)
    Models.splitMetric(modelKind, td.task, data, split.train, split.test, seed, fast = false)
  }

  private def num(v: Any): Double = v match {
    case null       => 0.0
    case d: Double  => d
    case f: Float   => f.toDouble
    case i: Int     => i.toDouble
    case l: Long    => l.toDouble
    case s: Short   => s.toDouble
    case b: Boolean => if (b) 1.0 else 0.0
    case bd: java.math.BigDecimal => bd.doubleValue
    case other      => throw new IllegalArgumentException(s"non-numeric value $other")
  }
}
