package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.linalg.Mat

class MetricsSpec extends AnyFunSuite {

  test("accuracy counts argmax matches") {
    val scores = Mat.fromRows(Seq(Array(0.9, 0.1), Array(0.2, 0.8), Array(0.6, 0.4)))
    val labels = Mat.fromRows(Seq(Array(1.0, 0.0), Array(1.0, 0.0), Array(1.0, 0.0)))
    assert(math.abs(Metrics.accuracy(scores, labels) - 2.0 / 3) < 1e-12)
  }

  test("accuracy of perfect predictions is 1") {
    val labels = Mat.fromRows(Seq(Array(0.0, 1.0), Array(1.0, 0.0)))
    assert(Metrics.accuracy(labels, labels) == 1.0)
  }

  test("microF1 on a known confusion") {
    // preds: [1,1,0,0]; labels: [1,0,1,0] -> tp=1 fp=1 fn=1 -> F1 = 0.5
    val scores = Mat.fromRows(Seq(Array(0.9, 0.9, 0.1, 0.1)))
    val labels = Mat.fromRows(Seq(Array(1.0, 0.0, 1.0, 0.0)))
    assert(math.abs(Metrics.microF1(scores, labels) - 0.5) < 1e-12)
  }

  test("microF1 with no positives predicted is 0") {
    val scores = Mat.fromRows(Seq(Array(0.1, 0.1)))
    val labels = Mat.fromRows(Seq(Array(1.0, 1.0)))
    assert(Metrics.microF1(scores, labels) == 0.0)
  }

  test("AUC of perfect ranking is 1, inverted is 0") {
    val perfect = Seq((0.9, 1.0), (0.8, 1.0), (0.2, 0.0), (0.1, 0.0))
    assert(Metrics.auc(perfect) == 1.0)
    assert(Metrics.auc(perfect.map { case (s, y) => (1 - s, y) }) == 0.0)
  }

  test("AUC of constant scores is 0.5 (tie handling)") {
    val ties = Seq((0.5, 1.0), (0.5, 0.0), (0.5, 1.0), (0.5, 0.0))
    assert(math.abs(Metrics.auc(ties) - 0.5) < 1e-12)
  }

  test("AUC with one class present degrades to 0.5") {
    assert(Metrics.auc(Seq((0.4, 1.0), (0.6, 1.0))) == 0.5)
  }

  test("AUC on a mixed example") {
    // scores 0.1(neg) 0.4(pos) 0.35(neg) 0.8(pos): 3 of 4 pos>neg pairs -> wait:
    // pairs: (0.4>0.1)=1,(0.4>0.35)=1,(0.8>0.1)=1,(0.8>0.35)=1 -> AUC=1... use overlap
    val s = Seq((0.1, 0.0), (0.4, 1.0), (0.5, 0.0), (0.8, 1.0))
    // pos>neg pairs: (0.4,0.1)✓ (0.4,0.5)✗ (0.8,0.1)✓ (0.8,0.5)✓ -> 3/4
    assert(math.abs(Metrics.auc(s) - 0.75) < 1e-12)
  }

  test("forTask dispatches to the right metric") {
    val bin = Mat.fromRows(Seq(Array(0.9), Array(0.1)))
    val binLab = Mat.fromRows(Seq(Array(1.0), Array(0.0)))
    assert(Metrics.forTask("bce", bin, binLab) == 1.0) // AUC path
    val multi = Mat.fromRows(Seq(Array(0.9, 0.8)))
    val multiLab = Mat.fromRows(Seq(Array(1.0, 1.0)))
    assert(Metrics.forTask("bce", multi, multiLab) == 1.0) // micro-F1 path
    assert(Metrics.forTask("softmax", multi, Mat.fromRows(Seq(Array(1.0, 0.0)))) == 1.0)
  }
}
