package repro.nn

import org.scalatest.funsuite.AnyFunSuite
import repro.linalg.Mat
import scala.util.Random

class LossAdamSpec extends AnyFunSuite {

  test("softmaxCE of uniform logits is log(numClasses)") {
    val logits = Mat.zeros(4, 3)
    val labels = Mat.zeros(4, 3)
    for (r <- 0 until 4) labels(r, r % 3) = 1.0
    val (loss, _) = Loss.softmaxCE(logits, labels)
    assert(math.abs(loss - math.log(3.0)) < 1e-12)
  }

  test("softmaxCE gradient rows sum to zero") {
    val rng = new Random(1)
    val logits = Mat.rand(5, 4, rng)
    val labels = Mat.zeros(5, 4)
    for (r <- 0 until 5) labels(r, rng.nextInt(4)) = 1.0
    val (_, d) = Loss.softmaxCE(logits, labels)
    for (r <- 0 until 5) {
      val s = (0 until 4).map(c => d(r, c)).sum
      assert(math.abs(s) < 1e-12)
    }
  }

  test("softmaxCE finite-difference check") {
    val rng = new Random(2)
    val logits = Mat.rand(3, 4, rng)
    val labels = Mat.zeros(3, 4)
    for (r <- 0 until 3) labels(r, rng.nextInt(4)) = 1.0
    val (_, d) = Loss.softmaxCE(logits, labels)
    val eps = 1e-6
    for (r <- 0 until 3; c <- 0 until 4) {
      val orig = logits(r, c)
      logits(r, c) = orig + eps
      val (lp, _) = Loss.softmaxCE(logits, labels)
      logits(r, c) = orig - eps
      val (lm, _) = Loss.softmaxCE(logits, labels)
      logits(r, c) = orig
      assert(math.abs((lp - lm) / (2 * eps) - d(r, c)) < 1e-6)
    }
  }

  test("bceLogits of zero logits is log(2)") {
    val logits = Mat.zeros(3, 5)
    val labels = Mat.zeros(3, 5)
    val (loss, _) = Loss.bceLogits(logits, labels)
    assert(math.abs(loss - math.log(2.0)) < 1e-12)
  }

  test("bceLogits finite-difference check") {
    val rng = new Random(3)
    val logits = Mat.rand(3, 4, rng, 2.0)
    val labels = new Mat(3, 4, Array.fill(12)(if (rng.nextBoolean()) 1.0 else 0.0))
    val (_, d) = Loss.bceLogits(logits, labels)
    val eps = 1e-6
    for (r <- 0 until 3; c <- 0 until 4) {
      val orig = logits(r, c)
      logits(r, c) = orig + eps
      val (lp, _) = Loss.bceLogits(logits, labels)
      logits(r, c) = orig - eps
      val (lm, _) = Loss.bceLogits(logits, labels)
      logits(r, c) = orig
      assert(math.abs((lp - lm) / (2 * eps) - d(r, c)) < 1e-6)
    }
  }

  test("bceLogits is numerically stable for extreme logits") {
    val logits = Mat.fromRows(Seq(Array(500.0, -500.0)))
    val labels = Mat.fromRows(Seq(Array(1.0, 0.0)))
    val (loss, d) = Loss.bceLogits(logits, labels)
    assert(!loss.isNaN && !loss.isInfinite && loss < 1e-9)
    assert(d.data.forall(x => !x.isNaN))
  }

  test("activateScores softmax rows sum to 1") {
    val logits = Mat.rand(4, 5, new Random(9), 3.0)
    val s = Model.activateScores(logits, "softmax")
    for (r <- 0 until 4) assert(math.abs((0 until 5).map(c => s(r, c)).sum - 1.0) < 1e-12)
  }

  test("activateScores bce is elementwise sigmoid") {
    val logits = Mat.fromRows(Seq(Array(0.0, 100.0, -100.0)))
    val s = Model.activateScores(logits, "bce")
    assert(math.abs(s(0, 0) - 0.5) < 1e-12 && s(0, 1) > 0.999 && s(0, 2) < 0.001)
  }

  test("Adam minimizes a quadratic") {
    val params = Array(Array(5.0, -3.0))
    val adam = new Adam(Array(2), lr = 0.1)
    for (_ <- 1 to 500) {
      val grads = Array(Array(2 * params(0)(0), 2 * params(0)(1)))
      adam.step(params, grads)
    }
    assert(math.abs(params(0)(0)) < 1e-3 && math.abs(params(0)(1)) < 1e-3)
  }

  test("Adam first step size is ~lr regardless of gradient scale") {
    for (scale <- Seq(1e-4, 1.0, 1e4)) {
      val params = Array(Array(0.0))
      val adam = new Adam(Array(1), lr = 0.01)
      adam.step(params, Array(Array(scale)))
      assert(math.abs(params(0)(0) + 0.01) < 1e-6, s"scale $scale moved ${params(0)(0)}")
    }
  }

  test("model params get/set round trip") {
    val spec = ModelSpec("gat", 2, 4, 5, 3, 2, "softmax")
    val m1 = Model.build(spec, 1)
    val m2 = Model.build(spec, 2)
    m2.setParams(m1.getParams)
    val vb = NnTestUtil.randomBatch(spec, 8, 20, 3, seed = 8)
    assert(m1.predictLogits(vb, 1).approxEquals(m2.predictLogits(vb, 1), 0.0))
  }

  test("TrainedModel.materialize reproduces the source model") {
    val spec = ModelSpec("sage", 2, 4, 5, 3, 2, "bce")
    val m1 = Model.build(spec, 7)
    val tm = TrainedModel(spec, m1.getParams)
    val m2 = tm.materialize()
    val vb = NnTestUtil.randomBatch(spec, 8, 20, 3, seed = 8)
    assert(m1.predictLogits(vb, 1).approxEquals(m2.predictLogits(vb, 1), 0.0))
  }

  test("ModelSpec layer dims chain correctly") {
    val spec = ModelSpec("gcn", 3, inDim = 10, hidden = 7, embDim = 4, numClasses = 2, task = "softmax")
    assert(spec.layerDims(0) == ((10, 7)))
    assert(spec.layerDims(1) == ((7, 7)))
    assert(spec.layerDims(2) == ((7, 4)))
    val one = spec.copy(layers = 1)
    assert(one.layerDims(0) == ((10, 4)))
  }

  test("ModelSpec rejects unknown kinds and tasks") {
    intercept[IllegalArgumentException](ModelSpec("rgcn", 1, 1, 1, 1, 1, "softmax"))
    intercept[IllegalArgumentException](ModelSpec("gcn", 1, 1, 1, 1, 1, "hinge"))
  }
}
