package repro.exp

import repro.SparkSpec
import repro.baselines.FeatureSelectors
import repro.core.FeatAugConfig
import repro.data.Datasets
import repro.ml.{LRModel, XGBModel}

/** End-to-end smoke tests of the experiment harness at tiny scale (the
  * bench suites run the full tables at SF=0.1).
  */
class HarnessSpec extends SparkSpec {

  private lazy val budget = Experiments.testBudget
  private lazy val tmall = new Prepared(Datasets.tmallLite(spark, 0.004), budget)
  private lazy val covtype = new Prepared(Datasets.covtypeLite(spark, 0.004), budget)

  test("Prepared aligns keys, base features and labels from one collect") {
    assert(tmall.keyRows.length == tmall.baseX.length)
    assert(tmall.y.length == tmall.baseX.length)
    assert(tmall.baseX(0).length == tmall.td.baseFeatures.size)
    assert(tmall.keyRows(0).size == 2) // composite Tmall key
  }

  test("Prepared extracts a domain for every predicate attribute") {
    assert(tmall.domains.keySet == tmall.td.predAttrs.toSet)
  }

  test("ftCandidates has |F| x |A| members and uses the shared store") {
    val n = tmall.ftCandidates.size
    assert(n == tmall.td.aggFuncs.size * tmall.td.aggAttrs.size)
    assert(tmall.featureStore.size >= n)
  }

  test("directCandidates materializes one feature per numeric relevant column") {
    assert(covtype.directCandidates.size == covtype.td.directJoinAttrs.size)
    // One-to-one AVG reproduces the column itself.
    val f1 = covtype.directCandidates.find(_.name == "direct_f1").get.values
    val raw = covtype.td.relevant.select("data_index", "f1").collect()
      .map(r => r.getLong(0).toString -> r.getDouble(1)).toMap
    covtype.keyRows.zipWithIndex.foreach { case (k, i) =>
      assert(math.abs(f1(i) - raw(k.head)) < 1e-9)
    }
  }

  test("finalMetric returns a valid AUC for binary tasks") {
    val m = Methods.runFT(tmall, LRModel)
    assert(m >= 0.0 && m <= 1.0)
  }

  test("runFTSelector skips unsupported combinations and runs supported ones") {
    val merchant = new Prepared(Datasets.merchantLite(spark, 0.004), budget)
    assert(Methods.runFTSelector(merchant, LRModel, FeatureSelectors.Chi2Sel).isEmpty)
    assert(Methods.runFTSelector(tmall, LRModel, FeatureSelectors.MISel).isDefined)
  }

  test("runRandom and runFeatAug complete and produce valid metrics") {
    val r = Methods.runRandom(tmall, LRModel)
    val (f, trace) = Methods.runFeatAug(tmall, LRModel, FeatAugConfig(budget = budget, seed = 1))
    assert(r >= 0.0 && r <= 1.0)
    assert(f >= 0.0 && f <= 1.0)
    assert(trace.queries.nonEmpty && trace.realEvaluations > 0)
  }

  test("runARDA and runAutoFeature work on the one-to-one dataset") {
    val a = Methods.runARDA(covtype, XGBModel)
    val m = Methods.runAutoFeature(covtype, XGBModel, repro.baselines.AutoFeature.MAB)
    assert(a >= 0.0 && a <= 1.0)
    assert(m >= 0.0 && m <= 1.0)
  }

  test("ResultTable renders aligned markdown-style rows") {
    val t = ResultTable("T", Vector("a", "bb"), Vector(Vector("1", "2"), Vector("333", "4")))
    val lines = t.render.linesIterator.toVector
    assert(lines.head == "== T ==")
    assert(lines(1).startsWith("| a"))
    assert(lines.drop(2).forall(_.length == lines(1).length))
  }

  test("budgets: bench is larger than test, both valid") {
    assert(Experiments.benchBudget.numFeatures == 40)
    assert(Experiments.testBudget.numFeatures < Experiments.benchBudget.numFeatures)
  }
}
