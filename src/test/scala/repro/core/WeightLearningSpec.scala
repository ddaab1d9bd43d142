package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec
import repro.core.Types._
import repro.core.WeightLearning.WLConfig
import repro.mmdata.MultiModalSynth

class WeightLearningSpec extends AnyFunSuite with SparkSpec {

  // Modality 1 is much less noisy than modality 0 ⇒ learning should
  // assign it the larger weight (the paper's CelebA/Shopping pattern).
  private val ds = DatasetConfig("wl", n = 300, nQueries = 60, m = 2, dim = 16,
    dLat = 8, nClusters = 15, tau = 0.35, seed = 21L)
  private val enc = EncoderConfig("enc", targetNoise = 1.1, auxNoises = Seq(0.4))

  private lazy val objects = MultiModalSynth.objects(spark, ds).cache()
  private lazy val anchors = MultiModalSynth.queries(spark, ds, enc, seedTag = 1L)

  test("closed-form gradient matches numeric differentiation") {
    val t: Array[(Long, Array[Array[Double]])] = (0 until 8).map { i =>
      i.toLong -> Array.tabulate(2)(mi =>
        VecOps.normalize(VecOps.gaussianVec(5L, mi.toLong, i.toLong, 10)))
    }.toArray
    val anchor = MMQuery(0L, gt = 3L,
      vecs = Array.tabulate(2)(mi =>
        VecOps.normalize(VecOps.gaussianVec(6L, mi.toLong, 3L, 10)).toSeq).toSeq,
      comp = Seq.empty)
    // All-negatives config keeps N⁻ independent of w ⇒ smooth loss.
    val cfg = WLConfig(negatives = t.length - 1)
    val w = Array(0.7, 0.4)
    val (grad, _, _) = WeightLearning.anchorGrad(w, anchor, t, cfg)
    val eps = 1e-6
    (0 until 2).foreach { i =>
      val wp = w.clone(); wp(i) += eps
      val wm = w.clone(); wm(i) -= eps
      val (_, lp, _) = WeightLearning.anchorGrad(wp, anchor, t, cfg)
      val (_, lm, _) = WeightLearning.anchorGrad(wm, anchor, t, cfg)
      val numeric = (lp - lm) / (2 * eps)
      assert(math.abs(grad(i) - numeric) < 1e-5, s"modality $i: analytic=${grad(i)} numeric=$numeric")
    }
  }

  test("gradient pulls the positive closer: loss decreases after one step") {
    val t: Array[(Long, Array[Array[Double]])] = (0 until 10).map { i =>
      i.toLong -> Array.tabulate(2)(mi =>
        VecOps.normalize(VecOps.gaussianVec(7L, mi.toLong, i.toLong, 10)))
    }.toArray
    val anchor = MMQuery(0L, gt = 2L,
      vecs = t(2)._2.map(_.toSeq).toSeq, comp = Seq.empty) // anchor == positive: easy case
    val cfg = WLConfig(negatives = 4)
    val w = Array(0.5, 0.5)
    val (g, l0, _) = WeightLearning.anchorGrad(w, anchor, t, cfg)
    val w1 = Array.tabulate(2)(i => w(i) - 0.05 * g(i))
    val (_, l1, _) = WeightLearning.anchorGrad(w1, anchor, t, cfg)
    assert(l1 <= l0 + 1e-9, s"loss rose: $l0 -> $l1")
  }

  test("learn: loss history decreases overall") {
    val r = WeightLearning.learn(anchors, objects, ds.m, WLConfig(epochs = 40, lr = 0.05))
    assert(r.lossHistory.length == 40)
    assert(r.lossHistory.last < r.lossHistory.head,
      s"loss did not improve: ${r.lossHistory.head} -> ${r.lossHistory.last}")
  }

  test("learn: the cleaner modality receives the larger weight") {
    val r = WeightLearning.learn(anchors, objects, ds.m, WLConfig(epochs = 60, lr = 0.05))
    assert(r.weights(1) > r.weights(0),
      s"expected aux-dominant weights, got ${r.weights.toSeq}")
  }

  test("learn: weights stay non-negative") {
    val r = WeightLearning.learn(anchors, objects, ds.m, WLConfig(epochs = 60, lr = 0.2))
    assert(r.weights.forall(_ >= 0.0))
  }

  test("learn: top-1 training accuracy improves over the run") {
    val r = WeightLearning.learn(anchors, objects, ds.m, WLConfig(epochs = 60, lr = 0.05))
    val early = r.top1History.take(5).max
    val late = r.top1History.takeRight(5).max
    assert(late >= early, s"top1 degraded: $early -> $late")
  }

  test("learn is deterministic up to floating-point reduce order") {
    // treeReduce sums per-anchor gradients in partition order, so repeated
    // runs can differ in the last ulp — but nothing more.
    val a = WeightLearning.learn(anchors, objects, ds.m, WLConfig(epochs = 10))
    val b = WeightLearning.learn(anchors, objects, ds.m, WLConfig(epochs = 10))
    a.weights.zip(b.weights).foreach { case (x, y) => assert(math.abs(x - y) < 1e-9) }
    a.lossHistory.zip(b.lossHistory).foreach { case (x, y) => assert(math.abs(x - y) < 1e-9) }
  }

  test("hard negatives reach at least the training quality of random negatives") {
    val hard = WeightLearning.learn(anchors, objects, ds.m,
      WLConfig(epochs = 40, hardNegatives = true))
    val rand = WeightLearning.learn(anchors, objects, ds.m,
      WLConfig(epochs = 40, hardNegatives = false))
    assert(hard.top1History.last >= rand.top1History.last - 0.05,
      s"hard=${hard.top1History.last} rand=${rand.top1History.last}")
  }

  test("anchorGrad rejects an anchor whose gt is missing from T") {
    val t = Array(1L -> Array(Array(1.0, 0.0), Array(0.0, 1.0)))
    val anchor = MMQuery(0L, gt = 99L, vecs = Seq(Seq(1.0, 0.0), Seq(0.0, 1.0)), comp = Seq.empty)
    intercept[IllegalArgumentException](
      WeightLearning.anchorGrad(Array(0.5, 0.5), anchor, t, WLConfig()))
  }
}
