package repro.core

import repro.SparkSpec
import repro.graph._
import repro.nn.ModelSpec
import repro.tables.Tables

class TrainerSpec extends SparkSpec {

  private lazy val tiny: LocalGraph = GraphGen.uugLite(n = 300, labeledFrac = 0.8)
  private lazy val tinyEx: Map[String, Array[Example]] =
    Tables.splitExamples(spark, tiny, FlatConfig(2, NoSampling, seed = 1))
  private def spec(kind: String) =
    ModelSpec(kind, 2, inDim = 32, hidden = 8, embDim = 8, numClasses = 1, task = "bce")

  test("LocalTrainer loss decreases and the model learns the tiny task") {
    val res = LocalTrainer.train(tinyEx("train"), tinyEx("val"), spec("gcn"),
      TrainOpts(epochs = 25, batchSize = 64, lr = 0.02, threads = 4))
    val first = res.history.head.loss
    val last = res.history.takeRight(3).map(_.loss).min
    assert(last < first * 0.8, s"loss did not decrease: $first -> $last")
    assert(res.bestVal > 0.6, s"val AUC ${res.bestVal}")
  }

  test("pipeline on/off produce identical training trajectories") {
    def run(pipeline: Boolean) = LocalTrainer.train(
      tinyEx("train"), Array.empty, spec("sage"),
      TrainOpts(epochs = 4, batchSize = 64, lr = 0.02, pipeline = pipeline))
    val a = run(true); val b = run(false)
    assert(a.history.map(_.loss) == b.history.map(_.loss))
    a.model.params.zip(b.model.params).foreach { case (x, y) => assert(x.toSeq == y.toSeq) }
  }

  test("pruning on/off produce identical training trajectories") {
    def run(prune: Boolean) = LocalTrainer.train(
      tinyEx("train"), Array.empty, spec("gcn"),
      TrainOpts(epochs = 4, batchSize = 64, lr = 0.02, prune = prune))
    val a = run(true); val b = run(false)
    assert(a.history.map(_.loss) == b.history.map(_.loss))
  }

  test("edge partitioning on/off produce identical training trajectories") {
    def run(part: Boolean) = LocalTrainer.train(
      tinyEx("train"), Array.empty, spec("gat"),
      TrainOpts(epochs = 3, batchSize = 64, lr = 0.02, threads = 8, partition = part))
    val a = run(true); val b = run(false)
    assert(a.history.map(_.loss) == b.history.map(_.loss))
  }

  test("LocalTrainer is deterministic in its seed") {
    def run() = LocalTrainer.train(tinyEx("train"), Array.empty, spec("gcn"),
      TrainOpts(epochs = 3, batchSize = 64, lr = 0.02, seed = 77))
    assert(run().history.map(_.loss) == run().history.map(_.loss))
  }

  test("FullGraphTrainer learns the tiny task too") {
    val res = FullGraphTrainer.train(tiny, spec("gcn"),
      TrainOpts(epochs = 60, batchSize = 0, lr = 0.02, threads = 4))
    assert(res.bestVal > 0.6, s"val AUC ${res.bestVal}")
    val test = FullGraphTrainer.evaluateFull(tiny, res.model, "test", 4)
    assert(test > 0.55, s"test AUC $test")
  }

  test("PsTrainer converges and matches LocalTrainer-quality AUC") {
    import spark.implicits._
    val trainDs = spark.createDataset(
      tinyEx("train").toIndexedSeq.map(e => FlatExample(e.target, e.label, GraphFeature.encode(e.gf))))
    val res = PsTrainer.train(spark, trainDs, tinyEx("val"), spec("gcn"),
      PsOpts(epochs = 40, batchSize = 64, lr = 0.05, numWorkers = 4, evalEvery = 5))
    val first = res.history.head.loss
    val last = res.history.takeRight(5).map(_.loss).min
    assert(last < first, s"PS loss did not decrease: $first -> $last")
    assert(res.bestVal > 0.6, s"PS val AUC ${res.bestVal}")
  }

  test("PsTrainer gradient equals the full-batch gradient regardless of worker count") {
    import spark.implicits._
    // single epoch, batch covering everything per partition, lr 0 after step:
    // run 1 epoch with 1 vs 4 workers and batchSize >= partition size; the
    // mean-of-batch-gradients must coincide with the full-batch gradient, so
    // the post-step parameters agree across worker counts.
    val trainDs = spark.createDataset(
      tinyEx("train").take(40).toIndexedSeq
        .map(e => FlatExample(e.target, e.label, GraphFeature.encode(e.gf))))
    def run(workers: Int) = PsTrainer.train(spark, trainDs, Array.empty, spec("gcn"),
      PsOpts(epochs = 1, batchSize = 10, lr = 0.01, numWorkers = workers, seed = 3)).model.params
    val a = run(1); val b = run(4)
    // batches differ in composition, so allow small numerical drift only if
    // sizes divide evenly; 40 examples / 10 per batch divides for both.
    val maxDiff = a.zip(b).flatMap { case (x, y) => x.zip(y).map { case (u, v) => math.abs(u - v) } }.max
    assert(maxDiff < 1e-9, s"PS params diverge across worker counts: $maxDiff")
  }

  test("evaluate on a TrainedModel reproduces in-training evaluation") {
    val res = LocalTrainer.train(tinyEx("train"), tinyEx("val"), spec("gcn"),
      TrainOpts(epochs = 5, batchSize = 64, lr = 0.02))
    val direct = LocalTrainer.evaluate(res.model, tinyEx("val"), 64, 2)
    assert(math.abs(direct - res.bestVal) < 1e-9)
  }

  test("ModelIO round-trips a trained model") {
    val res = LocalTrainer.train(tinyEx("train"), Array.empty, spec("gat"),
      TrainOpts(epochs = 2, batchSize = 64, lr = 0.02))
    val path = java.nio.file.Files.createTempFile("agl-model", ".bin").toString
    ModelIO.save(res.model, path)
    val back = ModelIO.load(path)
    assert(back.spec == res.model.spec)
    back.params.zip(res.model.params).foreach { case (a, b) => assert(a.toSeq == b.toSeq) }
    val e1 = LocalTrainer.evaluate(res.model, tinyEx("test"), 64, 2)
    val e2 = LocalTrainer.evaluate(back, tinyEx("test"), 64, 2)
    assert(e1 == e2)
  }
}
