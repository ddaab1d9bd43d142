package repro.core

import org.apache.spark.sql.Dataset
import repro.core.Types._

/** Vector weight learning (paper §VI).
  *
  * Learns the modality weights w = (ω₀², …, ω_{m-1}²) that define the joint
  * similarity IP(p̂, ô) = Σᵢ wᵢ·IPᵢ (Lemma 1). Training minimizes the
  * softmax contrastive loss of Eq. 6 over a DataFrame of anchors (training
  * queries) whose positives are their true objects in T, with *hard*
  * negatives re-mined every epoch via vector search over T under the
  * current weights (Eq. 5).
  *
  * Distribution: each epoch is one Spark job — per-anchor gradients and
  * losses are computed in `mapPartitions` (T and the current weights are
  * broadcast) and reduced with `treeReduce`, i.e. the gradient is computed
  * via aggregation over the anchor set; the driver then takes one
  * full-batch gradient-descent step (the paper's minibatch SGD with
  * 700 iterations ≈ our full-batch GD with ~80 epochs at the same loss).
  *
  * The closed-form gradient of Eq. 6 w.r.t. wᵢ for one anchor p is
  *   ∂L_p/∂wᵢ = −IPᵢ(p, p⁺) + Σ_{x ∈ {p⁺} ∪ N⁻} softmax(s_x)·IPᵢ(p, x),
  * with s_x = Σᵢ wᵢ·IPᵢ(p, x); verified against numeric differentiation in
  * the test suite.
  */
object WeightLearning {

  final case class WLConfig(
      epochs: Int = 80,
      lr: Double = 0.05,
      negatives: Int = 5,       // |N⁻| (paper App. G studies this knob)
      init: Double = 0.5,       // paper: random init; we use a fixed start for determinism
      hardNegatives: Boolean = true, // false ⇒ random negatives (Fig. 9 ablation)
      seed: Long = 7L,
  )

  final case class TrainResult(
      weights: Array[Double],
      lossHistory: Seq[Double],
      top1History: Seq[Double], // fraction of anchors whose positive ranks first in T
  )

  /** One anchor's contribution: (gradient over m weights, loss, top1 hit).
    * Package-visible so the test suite can check the closed-form gradient
    * against numeric differentiation. */
  private[core] def anchorGrad(
      w: Array[Double],
      anchor: MMQuery,
      t: Array[(Long, Array[Array[Double]])],
      cfg: WLConfig,
  ): (Array[Double], Double, Double) = {
    val m = w.length
    val qv = anchor.vecs.map(_.toArray).toArray
    // Per-modality IPs of the anchor against every object in T.
    val ips = t.map { case (_, ov) =>
      Array.tabulate(m)(i =>
        if (i < qv.length && qv(i).length > 0) VecOps.dot(qv(i), ov(i)) else 0.0)
    }
    val joint = ips.map(ip => { var s = 0.0; var i = 0; while (i < m) { s += w(i) * ip(i); i += 1 }; s })

    val posIdx = t.indexWhere(_._1 == anchor.gt)
    require(posIdx >= 0, s"anchor gt ${anchor.gt} missing from T")

    // Eq. 5: R = top-k of T under current weights (k = |N⁻| + 1 so that
    // N⁻ = R \ {p⁺} has |N⁻| elements when the positive is in R).
    val nNeg = math.min(cfg.negatives, t.length - 1)
    val negIdxs: Array[Int] =
      if (cfg.hardNegatives) {
        val order = joint.zipWithIndex.sortBy(-_._1).map(_._2)
        order.take(nNeg + 1).filter(_ != posIdx).take(nNeg)
      } else {
        val rng = new scala.util.Random(VecOps.mix64(cfg.seed ^ anchor.qid))
        Iterator.continually(rng.nextInt(t.length))
          .filter(_ != posIdx).distinct.take(nNeg).toArray
      }

    val top1 = if (joint.zipWithIndex.maxBy(_._1)._2 == posIdx) 1.0 else 0.0

    // Softmax over {positive} ∪ negatives (stable via max-shift).
    val idxs = posIdx +: negIdxs
    val ss = idxs.map(joint)
    val mx = ss.max
    val es = ss.map(s => math.exp(s - mx))
    val z = es.sum
    val loss = -math.log(es(0) / z)
    val grad = new Array[Double](m)
    var i = 0
    while (i < m) {
      var g = -ips(posIdx)(i)
      var j = 0
      while (j < idxs.length) { g += (es(j) / z) * ips(idxs(j))(i); j += 1 }
      grad(i) = g
      i += 1
    }
    (grad, loss, top1)
  }

  /** Runs the learning loop; `anchors` is the training-query DataFrame and
    * `objects` supplies T = the anchors' true objects. */
  def learn(
      anchors: Dataset[MMQuery],
      objects: Dataset[MMObject],
      m: Int,
      cfg: WLConfig = WLConfig(),
  ): TrainResult = {
    val spark = anchors.sparkSession
    val anchorRows = anchors // cached: re-scanned every epoch
    anchorRows.cache()
    val nAnchors = anchorRows.count().toDouble
    require(nAnchors > 0, "no training anchors")

    // T: true objects of the anchors (paper §VI-A), small enough to broadcast.
    val gtIds = anchorRows.select("gt").distinct().collect().map(_.getLong(0)).toSet
    val t: Array[(Long, Array[Array[Double]])] = objects
      .filter(o => gtIds.contains(o.id))
      .collect()
      .map(o => o.id -> o.vecs.map(_.toArray).toArray)
      .sortBy(_._1)
    require(t.length == gtIds.size, "some anchor gts missing from object set")

    var w = Array.fill(m)(cfg.init)
    val losses = Vector.newBuilder[Double]
    val top1s = Vector.newBuilder[Double]

    for (_ <- 0 until cfg.epochs) {
      val bw = spark.sparkContext.broadcast(w)
      val bt = spark.sparkContext.broadcast(t)
      val (gradSum, lossSum, hitSum) = anchorRows.rdd
        .mapPartitions { it =>
          val ww = bw.value; val tt = bt.value
          it.map(a => anchorGrad(ww, a, tt, cfg))
        }
        .treeReduce { case ((g1, l1, h1), (g2, l2, h2)) =>
          (VecOps.axpy(g1, 1.0, g2), l1 + l2, h1 + h2)
        }
      losses += lossSum / nAnchors
      top1s += hitSum / nAnchors
      w = Array.tabulate(m)(i => math.max(0.0, w(i) - cfg.lr * gradSum(i) / nAnchors))
      bw.destroy(); bt.destroy()
    }
    anchorRows.unpersist()
    TrainResult(w, losses.result(), top1s.result())
  }
}
