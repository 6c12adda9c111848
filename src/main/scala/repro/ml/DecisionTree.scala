package repro.ml

import scala.util.Random

/** CART regression tree fit to real-valued targets by variance reduction.
  *
  * The tree is the shared building block: random forests bag
  * classification/regression trees over class indicators, and the gradient
  * booster fits trees to pseudo-residuals. Splits scan sorted unique
  * midpoints on a random subset of features (`featureFraction`).
  */
final class RegressionTree(
    maxDepth: Int = 5,
    minSamplesLeaf: Int = 5,
    featureFraction: Double = 1.0,
    seed: Long = 11L,
) {

  /** A fitted tree node: either a split or a leaf value. */
  sealed trait Node
  final case class Split(feature: Int, threshold: Double, left: Node, right: Node) extends Node
  final case class Leaf(value: Double) extends Node

  private var rootOpt: Option[Node] = None
  private val rnd = new Random(seed)

  def fit(x: Array[Array[Double]], y: Array[Double]): this.type = {
    require(x.length == y.length && x.nonEmpty, "need non-empty aligned data")
    rootOpt = Some(build(x, y, x.indices.toArray, 0))
    this
  }

  def predict(row: Array[Double]): Double = {
    var node = rootOpt.getOrElse(throw new IllegalStateException("tree not fitted"))
    while (true) {
      node match {
        case Leaf(v)                  => return v
        case Split(f, t, left, right) => node = if (row(f) <= t) left else right
      }
    }
    0.0 // unreachable
  }

  private def mean(y: Array[Double], idx: Array[Int]): Double = {
    var s = 0.0; var i = 0
    while (i < idx.length) { s += y(idx(i)); i += 1 }
    s / idx.length
  }

  private def build(x: Array[Array[Double]], y: Array[Double], idx: Array[Int], depth: Int): Node = {
    if (depth >= maxDepth || idx.length < 2 * minSamplesLeaf) return Leaf(mean(y, idx))
    val m = x(0).length
    val nFeat = math.max(1, math.ceil(m * featureFraction).toInt)
    val feats = rnd.shuffle((0 until m).toList).take(nFeat)

    // Best split = max variance reduction, found with a single sorted sweep
    // per feature using prefix sums.
    var bestGain = 1e-12
    var bestFeat = -1
    var bestThr = 0.0
    val total = { var s = 0.0; var s2 = 0.0; idx.foreach { i => s += y(i); s2 += y(i) * y(i) }; (s, s2) }
    val n = idx.length.toDouble
    val parentSse = total._2 - total._1 * total._1 / n

    for (f <- feats) {
      val sorted = idx.sortBy(x(_)(f))
      var ls = 0.0; var ls2 = 0.0
      var i = 0
      while (i < sorted.length - 1) {
        val yi = y(sorted(i))
        ls += yi; ls2 += yi * yi
        val cur = x(sorted(i))(f)
        val nxt = x(sorted(i + 1))(f)
        if (cur != nxt && i + 1 >= minSamplesLeaf && sorted.length - i - 1 >= minSamplesLeaf) {
          val nl = (i + 1).toDouble
          val nr = n - nl
          val rs = total._1 - ls
          val rs2 = total._2 - ls2
          val sse = (ls2 - ls * ls / nl) + (rs2 - rs * rs / nr)
          val gain = parentSse - sse
          if (gain > bestGain) { bestGain = gain; bestFeat = f; bestThr = (cur + nxt) / 2.0 }
        }
        i += 1
      }
    }

    if (bestFeat < 0) Leaf(mean(y, idx))
    else {
      val (li, ri) = idx.partition(x(_)(bestFeat) <= bestThr)
      if (li.isEmpty || ri.isEmpty) Leaf(mean(y, idx))
      else Split(bestFeat, bestThr, build(x, y, li, depth + 1), build(x, y, ri, depth + 1))
    }
  }

  /** Accumulate, per feature, the total variance reduction of its splits
    * weighted by node size — the "feature importance" used by the GBDT/RF
    * selectors. Adds into `acc`.
    */
  def addImportance(acc: Array[Double]): Unit = {
    def walk(node: Node): Unit = node match {
      case Split(f, _, l, r) => acc(f) += 1.0; walk(l); walk(r)
      case _                 =>
    }
    rootOpt.foreach(walk)
  }
}
