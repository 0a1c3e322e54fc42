package repro.nn

import org.scalatest.funsuite.AnyFunSuite

/** Finite-difference validation of every layer's hand-derived backward pass,
  * across model kinds, depths and both loss heads. One registered test per
  * configuration.
  */
class GradCheckSpec extends AnyFunSuite {

  private val configs = for {
    kind <- Seq("gcn", "sage", "gat")
    layers <- Seq(1, 2, 3)
    task <- Seq("softmax", "bce")
  } yield (kind, layers, task)

  for ((kind, layers, task) <- configs) {
    test(s"gradients of $layers-layer $kind with $task loss match finite differences") {
      val spec = ModelSpec(kind, layers, inDim = 5, hidden = 6, embDim = 4,
        numClasses = 3, task = task)
      val vb = NnTestUtil.randomBatch(spec, n = 14, e = 40, numTargets = 5,
        seed = kind.hashCode + layers * 31 + task.hashCode)
      val (rel, abs) = NnTestUtil.gradCheck(spec, vb, seed = 3)
      // relative tolerance is loose enough to absorb a ReLU kink grazing eps
      assert(rel < 5e-3 || abs < 1e-6, f"worst relative error $rel%.2e (abs $abs%.2e)")
    }
  }

  for (kind <- Seq("gcn", "sage", "gat")) {
    test(s"$kind binary-head (1 output) gradients match finite differences") {
      val spec = ModelSpec(kind, 2, inDim = 4, hidden = 5, embDim = 3, numClasses = 1, task = "bce")
      val vb = NnTestUtil.randomBatch(spec, n = 10, e = 25, numTargets = 4, seed = 77)
      val (rel, abs) = NnTestUtil.gradCheck(spec, vb, seed = 9)
      assert(rel < 5e-3 || abs < 1e-6, f"worst relative error $rel%.2e (abs $abs%.2e)")
    }
  }

  test("gradients vanish at a perfectly-fit softmax head") {
    // With a single target and a huge correct logit, CE grads go to ~0.
    val spec = ModelSpec("gcn", 1, inDim = 2, hidden = 2, embDim = 2, numClasses = 2, task = "softmax")
    val vb = NnTestUtil.randomBatch(spec, n = 4, e = 6, numTargets = 1, seed = 5)
    val model = Model.build(spec, 1)
    val pref = model.getParamsRef
    // crank the predictor bias towards the true class
    val trueClass = if (vb.labels(0, 0) > 0) 0 else 1
    pref.last(trueClass) = 50.0
    val (loss, grads) = model.lossAndGrad(vb, 1)
    assert(loss < 1e-6)
    assert(grads.flatten.forall(g => math.abs(g) < 1e-4))
  }

  test("graph with isolated nodes still backprops cleanly") {
    val spec = ModelSpec("sage", 2, inDim = 3, hidden = 4, embDim = 3, numClasses = 2, task = "softmax")
    val vb0 = NnTestUtil.randomBatch(spec, n = 8, e = 4, numTargets = 3, seed = 21)
    val (rel, abs) = NnTestUtil.gradCheck(spec, vb0, seed = 4)
    assert(rel < 5e-3 || abs < 1e-6)
  }
}
