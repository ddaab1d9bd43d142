package repro.bench

import repro.eval.TableRunners

/** Tables XIII–XVIII (App. K) — learned weights ω² per dataset × encoder.
  * The paper's qualitative pattern, which the bench asserts:
  *  - CelebA / Shopping: text (modality 1) strongly dominant
  *    (e.g. Shopping ResNet17+Encoding: ω₀²=0.026, ω₁²=1.212);
  *  - ImageText/AudioText: text-leaning (0.12/0.56, 0.045/0.86);
  *  - VideoText: balanced (0.31/0.44).
  */
class TableXIIIToXVIIIBench extends BenchSpec {

  // Paper values (ω₀², ω₁², …) for the rows our analogs reproduce.
  val paper: Map[(String, String), Seq[Double]] = Map(
    ("MIT-States", "ResNet17+LSTM") -> Seq(0.3000, 0.7000),
    ("MIT-States", "ResNet50+LSTM") -> Seq(0.0012, 1.4291),
    ("MIT-States", "ResNet17+Transformer") -> Seq(0.1172, 0.2669),
    ("MIT-States", "ResNet50+Transformer") -> Seq(0.5000, 0.5000),
    ("MIT-States", "TIRG+LSTM") -> Seq(0.5000, 0.5000),
    ("MIT-States", "TIRG+Transformer") -> Seq(0.0295, 0.0224),
    ("MIT-States", "CLIP+LSTM") -> Seq(0.5000, 0.5000),
    ("MIT-States", "CLIP+Transformer") -> Seq(0.0670, 0.0432),
    ("CelebA", "ResNet17+Encoding") -> Seq(0.0007, 0.9526),
    ("CelebA", "ResNet50+Encoding") -> Seq(0.0848, 1.1855),
    ("CelebA", "TIRG+Encoding") -> Seq(0.1064, 0.6414),
    ("CelebA", "CLIP+Encoding") -> Seq(0.1089, 0.8551),
    ("Shopping-Tshirt", "ResNet17+Encoding") -> Seq(0.0262, 1.2124),
    ("Shopping-Tshirt", "TIRG+Encoding") -> Seq(0.0092, 1.2042),
    ("MS-COCO", "MPC+GRU+ResNet50") -> Seq(0.0083, 0.0342, 0.0123),
    ("MS-COCO", "ResNet50+GRU+ResNet50") -> Seq(0.0091, 0.0233, 0.0144),
    ("CelebA+", "CLIP+Encoding+ResNet17+ResNet50") -> Seq(0.4092, 3.1363, 0.0721, 0.0290),
    ("ImageText", "default") -> Seq(0.1199, 0.5572),
    ("AudioText", "default") -> Seq(0.0453, 0.8589),
    ("VideoText", "default") -> Seq(0.3106, 0.4440),
  )

  private lazy val rows = TableRunners.tableXIIIToXVIII(spark)

  test("Tables XIII-XVIII: print paper vs measured learned weights") {
    banner("Tables XIII–XVIII — learned weights ω² per dataset × encoder")
    rows.foreach { r =>
      val p = paper.get((r.dataset, r.encoder)).map(_.map(v => f"$v%.4f").mkString(","))
        .getOrElse("n/a")
      println(f"${r.dataset}%-16s ${r.encoder.take(32)}%-32s paper=[$p] ours=[${r.weights.map(w => f"$w%.4f").mkString(",")}]")
    }
    assert(rows.size == 20)
  }

  test("weights pattern: CelebA rows are text-dominant") {
    rows.filter(_.dataset == "CelebA").foreach(r =>
      assert(r.weights(1) > r.weights(0), s"${r.encoder}: ${r.weights}"))
  }

  test("weights pattern: Shopping rows are text-dominant, raw-image row strongly so") {
    rows.filter(_.dataset == "Shopping-Tshirt").foreach(r =>
      assert(r.weights(1) > r.weights(0), s"${r.encoder}: ${r.weights}"))
    // Raw image (paper: ω₀²=0.026 vs ω₁²=1.212) — the extreme split; the
    // TIRG row's slot 0 is a composition vector, which carries signal in
    // our analog, so only the raw-image row must show the 2x dominance.
    val r17 = rows.find(r => r.dataset == "Shopping-Tshirt" && r.encoder == "ResNet17+Encoding").get
    assert(r17.weights(1) > 2 * r17.weights(0), s"${r17.weights}")
  }

  test("weights pattern: AudioText is more text-skewed than VideoText") {
    val audio = rows.find(_.dataset == "AudioText").get.weights
    val video = rows.find(_.dataset == "VideoText").get.weights
    def skew(w: Seq[Double]): Double = w(1) / math.max(w(0), 1e-6)
    assert(skew(audio) > skew(video), s"audio=$audio video=$video")
  }

  test("weights pattern: all learned weights are non-negative and finite") {
    rows.foreach(r => r.weights.foreach(w => assert(w >= 0.0 && !w.isNaN && !w.isInfinite)))
  }
}
