package repro.ml

/** Evaluation metrics used in the paper's tables: AUC (binary), macro F1
  * (multi-class) and RMSE (regression). `taskLoss` converts each to a
  * minimization objective for the TPE search (1-AUC, 1-F1, RMSE).
  */
object Metrics {

  /** Area under the ROC curve via the rank statistic (ties share ranks).
    * `y` must be 0/1; returns 0.5 when one class is absent.
    */
  def auc(y: Array[Double], scores: Array[Double]): Double = {
    require(y.length == scores.length, "length mismatch")
    val nPos = y.count(_ > 0.5).toDouble
    val nNeg = y.length - nPos
    if (nPos == 0 || nNeg == 0) return 0.5
    // Average ranks over tied scores.
    val order = scores.indices.sortBy(scores(_))
    val ranks = new Array[Double](y.length)
    var i = 0
    while (i < order.length) {
      var j = i
      while (j + 1 < order.length && scores(order(j + 1)) == scores(order(i))) j += 1
      val avgRank = (i + j + 2) / 2.0 // ranks are 1-based
      var k = i
      while (k <= j) { ranks(order(k)) = avgRank; k += 1 }
      i = j + 1
    }
    val sumPosRanks = y.indices.iterator.filter(y(_) > 0.5).map(ranks(_)).sum
    (sumPosRanks - nPos * (nPos + 1) / 2.0) / (nPos * nNeg)
  }

  /** Macro-averaged F1 over classes 0..numClasses-1. Classes absent from
    * both truth and prediction contribute F1 = 0, matching scikit-learn's
    * default `zero_division=0` behaviour used by the paper's stack.
    */
  def macroF1(yTrue: Array[Int], yPred: Array[Int], numClasses: Int): Double = {
    require(yTrue.length == yPred.length, "length mismatch")
    var sum = 0.0
    var c = 0
    while (c < numClasses) {
      var tp = 0; var fp = 0; var fn = 0
      var i = 0
      while (i < yTrue.length) {
        if (yPred(i) == c && yTrue(i) == c) tp += 1
        else if (yPred(i) == c) fp += 1
        else if (yTrue(i) == c) fn += 1
        i += 1
      }
      val prec = if (tp + fp == 0) 0.0 else tp.toDouble / (tp + fp)
      val rec = if (tp + fn == 0) 0.0 else tp.toDouble / (tp + fn)
      sum += (if (prec + rec == 0) 0.0 else 2 * prec * rec / (prec + rec))
      c += 1
    }
    sum / numClasses
  }

  /** Root mean squared error. */
  def rmse(y: Array[Double], pred: Array[Double]): Double = {
    require(y.length == pred.length && y.nonEmpty, "need non-empty equal-length arrays")
    math.sqrt(y.indices.iterator.map(i => { val d = y(i) - pred(i); d * d }).sum / y.length)
  }

  /** Binary cross-entropy with probability clipping. */
  def logLoss(y: Array[Double], p: Array[Double]): Double = {
    require(y.length == p.length && y.nonEmpty, "need non-empty equal-length arrays")
    val eps = 1e-12
    -y.indices.iterator.map { i =>
      val pi = math.min(1 - eps, math.max(eps, p(i)))
      y(i) * math.log(pi) + (1 - y(i)) * math.log(1 - pi)
    }.sum / y.length
  }

  /** The metric the paper reports for a task (higher-is-better noted by caller). */
  def taskMetric(task: Task, y: Array[Double], scores: Array[Array[Double]]): Double = task match {
    case BinaryClassification => auc(y, scores.map(_(0)))
    case MultiClassification(k) =>
      macroF1(y.map(_.toInt), scores.map(s => s.indices.maxBy(s(_))), k)
    case Regression => rmse(y, scores.map(_(0)))
  }

  /** Minimization objective for the search: 1-AUC, 1-macroF1, or RMSE. */
  def taskLoss(task: Task, y: Array[Double], scores: Array[Array[Double]]): Double = task match {
    case Regression => taskMetric(task, y, scores)
    case _          => 1.0 - taskMetric(task, y, scores)
  }

  /** True iff a larger metric value is better for this task. */
  def higherIsBetter(task: Task): Boolean = task != Regression
}
