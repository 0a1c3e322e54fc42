package repro.core

import repro.linalg.Mat

/** Evaluation metrics used by the paper's Table 3: accuracy (Cora),
  * micro-F1 (PPI, multilabel at threshold 0.5), AUC (UUG, binary).
  */
object Metrics {

  /** Argmax accuracy for one-hot labels. */
  def accuracy(scores: Mat, labels: Mat): Double = {
    require(scores.rows == labels.rows && scores.cols == labels.cols)
    var correct = 0
    var r = 0
    while (r < scores.rows) {
      var bestS = 0; var bestL = 0
      var c = 1
      while (c < scores.cols) {
        if (scores(r, c) > scores(r, bestS)) bestS = c
        if (labels(r, c) > labels(r, bestL)) bestL = c
        c += 1
      }
      if (bestS == bestL) correct += 1
      r += 1
    }
    correct.toDouble / math.max(scores.rows, 1)
  }

  /** Micro-averaged F1 over all (row, label) cells; scores are probabilities. */
  def microF1(scores: Mat, labels: Mat, threshold: Double = 0.5): Double = {
    var tp = 0L; var fp = 0L; var fn = 0L
    var i = 0
    while (i < scores.data.length) {
      val p = scores.data(i) >= threshold
      val y = labels.data(i) >= 0.5
      if (p && y) tp += 1 else if (p && !y) fp += 1 else if (!p && y) fn += 1
      i += 1
    }
    if (tp == 0) 0.0 else 2.0 * tp / (2.0 * tp + fp + fn)
  }

  /** ROC AUC by the rank statistic (ties get average rank). */
  def auc(scoreAndLabel: Seq[(Double, Double)]): Double = {
    val pos = scoreAndLabel.count(_._2 >= 0.5).toDouble
    val neg = scoreAndLabel.size - pos
    if (pos == 0 || neg == 0) return 0.5
    val sorted = scoreAndLabel.sortBy(_._1)
    // average ranks over tied scores
    val ranks = new Array[Double](sorted.size)
    var i = 0
    while (i < sorted.size) {
      var j = i
      while (j + 1 < sorted.size && sorted(j + 1)._1 == sorted(i)._1) j += 1
      val avg = (i + j + 2) / 2.0 // 1-based
      var k = i
      while (k <= j) { ranks(k) = avg; k += 1 }
      i = j + 1
    }
    var posRankSum = 0.0
    i = 0
    while (i < sorted.size) { if (sorted(i)._2 >= 0.5) posRankSum += ranks(i); i += 1 }
    (posRankSum - pos * (pos + 1) / 2.0) / (pos * neg)
  }

  /** Metric for a task: softmax → accuracy, bce(1 col) → AUC, bce → micro-F1. */
  def forTask(task: String, scores: Mat, labels: Mat): Double =
    if (task == "softmax") accuracy(scores, labels)
    else if (scores.cols == 1)
      auc((0 until scores.rows).map(r => (scores(r, 0), labels(r, 0))))
    else microF1(scores, labels)
}
