package repro.ml

/** The supervised task a downstream model is trained for.
  *
  * The paper evaluates binary classification (AUC), multi-class
  * classification (macro F1) and regression (RMSE); the task drives both
  * the model head (sigmoid / softmax / identity) and the loss reported by
  * [[Metrics.taskLoss]].
  */
sealed trait Task {
  /** Number of output scores a predictor emits per row. */
  def numScores: Int
}

/** Binary classification; predictors emit P(y = 1). */
case object BinaryClassification extends Task { val numScores = 1 }

/** Multi-class classification with `numClasses` labels in 0..numClasses-1. */
final case class MultiClassification(numClasses: Int) extends Task {
  require(numClasses >= 2, s"need >= 2 classes, got $numClasses")
  val numScores: Int = numClasses
}

/** Real-valued regression; predictors emit the predicted value. */
case object Regression extends Task { val numScores = 1 }

/** A dense supervised dataset held on the driver.
  *
  * FeatAug's search loop trains hundreds of small models on the augmented
  * training table (a few thousand rows after aggregation), so models run
  * driver-side over plain arrays; Spark executes the feature queries that
  * *produce* these matrices.
  */
final case class DenseData(x: Array[Array[Double]], y: Array[Double]) {
  require(x.length == y.length, s"x rows ${x.length} != y rows ${y.length}")
  def numRows: Int = x.length
  def numCols: Int = if (x.isEmpty) 0 else x(0).length
  def select(idx: Array[Int]): DenseData = DenseData(idx.map(x), idx.map(y))
}

/** Per-column standardization (mean 0, stddev 1) fit on train rows only. */
final class Standardizer(mean: Array[Double], std: Array[Double]) {
  def transform(x: Array[Array[Double]]): Array[Array[Double]] =
    x.map(row => Array.tabulate(row.length)(j => (row(j) - mean(j)) / std(j)))
}

object Standardizer {
  /** Fit a standardizer; zero-variance columns get std 1 so they map to 0. */
  def fit(x: Array[Array[Double]]): Standardizer = {
    val n = math.max(1, x.length)
    val m = if (x.isEmpty) 0 else x(0).length
    val mean = Array.tabulate(m)(j => x.iterator.map(_(j)).sum / n)
    val std = Array.tabulate(m) { j =>
      val v = x.iterator.map(r => { val d = r(j) - mean(j); d * d }).sum / n
      val s = math.sqrt(v)
      if (s < 1e-12) 1.0 else s
    }
    new Standardizer(mean, std)
  }
}
