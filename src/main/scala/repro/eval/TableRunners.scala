package repro.eval

import org.apache.spark.sql.SparkSession
import repro.core.Types._
import repro.core.WeightLearning
import repro.baseline.MultiStreamRetrieval
import repro.graph.{FusedIndexBuilder, GraphQuality, JointSearch, VectorStore}
import repro.mmdata.{Datasets, MultiModalSynth}

/** One runner per paper table (Tables III–XXI). Shared by the benchmark
  * suites in `bench/` (which assert the paper's qualitative shape) and the
  * `jobs/` spark-submit entrypoints (which print the rows). Paper numbers
  * are recorded next to measured ones in EXPERIMENTS.md.
  */
object TableRunners {

  /** Default grid knobs for the accuracy tables (n≈2400 analogs). */
  val accuracyCfg: AccuracyHarness.GridConfig = AccuracyHarness.GridConfig()

  // ---- Tables III–VI: accuracy grids --------------------------------

  def tableIII(spark: SparkSession): Seq[AccuracyHarness.Row] =
    AccuracyHarness.runGrid(spark, Datasets.mitStates,
      Datasets.mitStatesEncoders, Datasets.mitStatesJeEncoders, accuracyCfg)

  def tableIV(spark: SparkSession): Seq[AccuracyHarness.Row] =
    AccuracyHarness.runGrid(spark, Datasets.celebA,
      Datasets.celebAEncoders, Datasets.celebAJeEncoders, accuracyCfg)

  def tableV(spark: SparkSession): Seq[AccuracyHarness.Row] =
    AccuracyHarness.runGrid(spark, Datasets.shoppingTshirt,
      Datasets.shoppingEncoders, Datasets.shoppingJeEncoders, accuracyCfg)

  def tableVI(spark: SparkSession): Seq[AccuracyHarness.Row] =
    AccuracyHarness.runGrid(spark, Datasets.msCoco,
      Datasets.msCocoEncoders, Datasets.msCocoJeEncoders,
      accuracyCfg.copy(ks = Seq(10, 50, 100), searchL = 150, mrL = 150))

  def tableXXI(spark: SparkSession): Seq[AccuracyHarness.Row] =
    AccuracyHarness.runGrid(spark, Datasets.shoppingBottoms,
      Datasets.shoppingEncoders, Datasets.shoppingJeEncoders, accuracyCfg)

  // ---- Table VII: data-volume scalability ---------------------------

  /** Scale analogs of the paper's 1M..16M sweep (DESIGN.md §1). */
  val scaleAnalogs: Seq[(String, Long)] =
    Seq("1M" -> 3000L, "2M" -> 6000L, "4M" -> 12000L, "8M" -> 24000L, "16M" -> 48000L)

  def tableVII(spark: SparkSession): Seq[(String, EfficiencyHarness.ScaleRow)] =
    scaleAnalogs.map { case (label, n) =>
      label -> EfficiencyHarness.scalePoint(spark, n, nQueries = 200, k = 10)
    }

  // ---- Table VIII: number of modalities -----------------------------

  final case class ModalityRow(m: Int, mustRecall10: Double, mrRecall10: Double)

  /** Recall vs number of modalities on the CelebA+ analog: queries use the
    * first m' modalities; MUST zeroes the weights of unused modalities
    * before the build (the paper's t = m per run). */
  def tableVIII(spark: SparkSession): Seq[ModalityRow] = {
    val ds = Datasets.celebAPlus
    val enc = Datasets.celebAPlusEncoder
    val ctx = AccuracyHarness.prepare(spark, ds, accuracyCfg.idx)
    try {
      Seq(2, 3, 4).map { mPrime =>
        val mask = (0 until ds.m).map(_ < mPrime)
        // Longer training (wider weight landscape at m = 4) and a larger
        // result set l: graph routing needs a deeper beam as the joint
        // space's intrinsic dimensionality grows with m.
        val cfg = accuracyCfg.copy(queryMask = mask, searchL = 200,
          wl = accuracyCfg.wl.copy(epochs = 150, lr = 0.08))
        val wl = AccuracyHarness.learnWeights(spark, ctx, enc, cfg)
        val w = wl.weights.zipWithIndex.map { case (x, i) => if (i < mPrime) x else 0.0 }
        val fused = FusedIndexBuilder.build(spark, ctx.store, w, cfg.idx)
        val evalQ = MultiModalSynth.queries(spark, ds, enc, mask = mask)
        val must = JointSearch.search(evalQ, fused, ctx.store, w, SearchConfig(k = 10, l = cfg.searchL))
          .collect()
        val mr = MultiStreamRetrieval.search(evalQ, ctx.oneHotIndexes, ctx.store, 10, cfg.mrL)
          .collect()
        ModalityRow(mPrime,
          Metrics.recallSingleGt(must.map(r => (r.gt, r.results)).toSeq, 10),
          Metrics.recallSingleGt(mr.map(r => (r.gt, r.results)).toSeq, 10))
      }
    } finally ctx.objects.unpersist()
  }

  // ---- Table IX: user-defined weights -------------------------------

  final case class UserWeightRow(w0: Double, w1: Double, ip0: Double, ip1: Double)

  /** User-defined weight sweep on MIT-States (best MUST encoder): the
    * fused index is built once with the learned weights; the search-time
    * weights are the user's (§VII-B Option 2 of Fig. 4(g)). */
  def tableIX(spark: SparkSession): Seq[UserWeightRow] = {
    val ds = Datasets.mitStates
    val enc = Datasets.mitStatesEncoders.find(_.name == "ResNet50+LSTM").get
    val objects = MultiModalSynth.objects(spark, ds).cache()
    objects.count()
    val store = VectorStore.collect(objects)
    val anchors = MultiModalSynth.queries(spark, ds, enc, seedTag = 1L, nQueries = accuracyCfg.nTrainAnchors)
    val wl = WeightLearning.learn(anchors, objects, ds.m, accuracyCfg.wl)
    val fused = FusedIndexBuilder.build(spark, store, wl.weights, accuracyCfg.idx)
    val evalQ = MultiModalSynth.queries(spark, ds, enc).cache()
    val qv = evalQ.collect().map(q => q.qid -> q.vecs.map(_.toArray).toArray).toMap
    val rows = Seq(0.5, 0.6, 0.7, 0.8, 0.9).map { w0 =>
      val w = Array(w0, 1.0 - w0)
      val res = JointSearch.search(evalQ, fused, store, w, SearchConfig(k = 1, l = accuracyCfg.searchL))
        .collect()
      val pairs = res.map(r => (qv(r.qid), r.results)).toSeq
      UserWeightRow(w0, 1.0 - w0,
        Metrics.meanModalityIp(pairs, store, 0),
        Metrics.meanModalityIp(pairs, store, 1))
    }
    objects.unpersist(); evalQ.unpersist()
    rows
  }

  // ---- Tables X / XIX / XX: single query modality -------------------

  final case class SingleModalityRow(dataset: String, modality: String, encoder: String,
                                     recalls: Seq[(Int, Double)]) {
    def recallAt(k: Int): Double = recalls.find(_._1 == k).get._2
  }

  /** t = 1 queries: the fused index is built on all modalities with
    * learned weights; search masks the absent modality's weight to zero
    * (§VII-B). `encoderPick` selects which named row configs to run. */
  def singleModality(spark: SparkSession, ds: DatasetConfig,
                     encoders: Seq[EncoderConfig], ks: Seq[Int]): Seq[SingleModalityRow] = {
    val ctx = AccuracyHarness.prepare(spark, ds, accuracyCfg.idx)
    try {
      // One fused index per encoder row (learned on full multimodal anchors).
      encoders.flatMap { enc =>
        val wl = AccuracyHarness.learnWeights(spark, ctx, enc, accuracyCfg)
        val fused = FusedIndexBuilder.build(spark, ctx.store, wl.weights, accuracyCfg.idx)
        Seq(("Target", Seq(true) ++ Seq.fill(ds.m - 1)(false)),
            ("Auxiliary", Seq(false, true) ++ Seq.fill(ds.m - 2)(false))).map {
          case (label, mask) =>
            val w = wl.weights.zipWithIndex.map { case (x, i) => if (mask(i)) x else 0.0 }
            val evalQ = MultiModalSynth.queries(spark, ds, enc, mask = mask)
            val res = JointSearch
              .search(evalQ, fused, ctx.store, w, SearchConfig(k = ks.max, l = accuracyCfg.searchL))
              .collect()
            val pairs = res.map(r => (r.gt, r.results)).toSeq
            SingleModalityRow(ds.name, label, enc.name,
              ks.map(k => k -> Metrics.recallSingleGt(pairs, k)))
        }
      }
    } finally ctx.objects.unpersist()
  }

  def tableX(spark: SparkSession): Seq[SingleModalityRow] =
    singleModality(spark, Datasets.mitStates,
      Seq(Datasets.mitStatesEncoders.find(_.name == "ResNet50+LSTM").get,
          Datasets.mitStatesEncoders.find(_.name == "ResNet50+Transformer").get),
      ks = Seq(1, 5, 10))

  def tableXIXXX(spark: SparkSession): Seq[SingleModalityRow] =
    singleModality(spark, Datasets.celebA,
      Seq(Datasets.celebAEncoders.find(_.name == "ResNet17+Encoding").get), Seq(1, 5, 10)) ++
    singleModality(spark, Datasets.shoppingTshirt,
      Seq(Datasets.shoppingEncoders.find(_.name == "ResNet17+Encoding").get), Seq(1, 5, 10))

  // ---- Table XI: graph quality vs NNDescent iterations --------------

  final case class GraphQualityRow(dataset: String, epsilon: Int, quality: Double)

  def tableXI(spark: SparkSession, n: Long = 3000L): Seq[GraphQualityRow] = {
    val cases = Seq(
      ("ImageText1M", Datasets.imageText(n), Datasets.imageTextEncoder),
      ("AudioText1M", Datasets.audioText(n), Datasets.audioTextEncoder),
      ("VideoText1M", Datasets.videoText(n), Datasets.videoTextEncoder),
    )
    cases.flatMap { case (label, ds, enc) =>
      val objects = MultiModalSynth.objects(spark, ds).cache()
      objects.count()
      val store = VectorStore.collect(objects)
      val anchors = MultiModalSynth.queries(spark, ds, enc, seedTag = 1L, nQueries = 150)
      val w = WeightLearning.learn(anchors, objects, ds.m, accuracyCfg.wl).weights
      val gamma = accuracyCfg.idx.gamma
      val exact = GraphQuality.exactNeighbors(spark, store, w, gamma)
      val rows = Seq(1, 2, 3).map { eps =>
        val adj = FusedIndexBuilder.nnDescentGraph(spark, store, w, gamma, eps)
        GraphQualityRow(label, eps, GraphQuality.quality(adj, exact, gamma))
      }
      objects.unpersist()
      rows
    }
  }

  // ---- Table XII: result-set size l ---------------------------------

  /** Paper l values (n = 1M) next to our scaled ladder (n = 8k). */
  val lLadder: Seq[(Int, Int)] =
    Seq(700 -> 20, 1000 -> 40, 1500 -> 80, 2000 -> 160, 4000 -> 320)

  def tableXII(spark: SparkSession): Seq[(Int, Int, EfficiencyHarness.LRow)] = {
    val p = EfficiencyHarness.prepare(spark, n = 8000L, nQueries = 200, k = 10)
    lLadder.map { case (paperL, ourL) =>
      (paperL, ourL, EfficiencyHarness.runAtL(spark, p, k = 10, l = ourL))
    }
  }

  // ---- Tables XIII–XVIII: learned weights ---------------------------

  final case class WeightsRow(dataset: String, encoder: String, weights: Seq[Double])

  def tableXIIIToXVIII(spark: SparkSession): Seq[WeightsRow] = {
    def learnFor(ds: DatasetConfig, encs: Seq[EncoderConfig]): Seq[WeightsRow] = {
      val objects = MultiModalSynth.objects(spark, ds).cache()
      objects.count()
      val rows = encs.map { enc =>
        val anchors = MultiModalSynth.queries(spark, ds, enc, seedTag = 1L,
          nQueries = accuracyCfg.nTrainAnchors)
        val w = WeightLearning.learn(anchors, objects, ds.m, accuracyCfg.wl).weights
        WeightsRow(ds.name, enc.name, w.toSeq)
      }
      objects.unpersist()
      rows
    }
    learnFor(Datasets.mitStates, Datasets.mitStatesEncoders) ++          // XIII
      learnFor(Datasets.celebA, Datasets.celebAEncoders) ++              // XIV
      learnFor(Datasets.shoppingTshirt, Datasets.shoppingEncoders) ++    // XV
      learnFor(Datasets.msCoco, Datasets.msCocoEncoders) ++              // XVI
      learnFor(Datasets.celebAPlus, Seq(Datasets.celebAPlusEncoder)) ++  // XVII
      learnFor(Datasets.imageText(3000L), Seq(Datasets.imageTextEncoder)) ++ // XVIII
      learnFor(Datasets.audioText(3000L), Seq(Datasets.audioTextEncoder)) ++
      learnFor(Datasets.videoText(3000L), Seq(Datasets.videoTextEncoder))
  }

  // ---- rendering helpers --------------------------------------------

  def renderAccuracy(title: String, rows: Seq[AccuracyHarness.Row]): String =
    (s"== $title ==" +: rows.map(_.fmt)).mkString("\n")
}
