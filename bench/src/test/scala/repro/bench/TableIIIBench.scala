package repro.bench

import repro.eval.TableRunners

/** Table III — search accuracy on the MIT-States analog.
  * Paper values: Recall@1(1), Recall@5(1), Recall@10(1), SME. */
class TableIIIBench extends BenchSpec {

  val paper: Map[(String, String), Seq[Double]] = Map(
    ("JE", "TIRG") -> Seq(0.1181, 0.3027, 0.4175, 0.1574),
    ("JE", "CLIP") -> Seq(0.2236, 0.4979, 0.6187, 0.1382),
    ("MR", "ResNet17+LSTM") -> Seq(0.3998, 0.6336, 0.7106, 0.1222),
    ("MR", "ResNet50+LSTM") -> Seq(0.5401, 0.7104, 0.7639, 0.1012),
    ("MR", "ResNet17+Transformer") -> Seq(0.2435, 0.4110, 0.4931, 0.1381),
    ("MR", "ResNet50+Transformer") -> Seq(0.3112, 0.4475, 0.5142, 0.1404),
    ("MR", "TIRG+LSTM") -> Seq(0.3768, 0.6574, 0.7691, 0.1283),
    ("MR", "TIRG+Transformer") -> Seq(0.2830, 0.4918, 0.5834, 0.1395),
    ("MR", "CLIP+LSTM") -> Seq(0.4911, 0.7619, 0.8436, 0.1108),
    ("MR", "CLIP+Transformer") -> Seq(0.3707, 0.5912, 0.6751, 0.1285),
    ("MUST", "ResNet17+LSTM") -> Seq(0.5275, 0.7897, 0.8780, 0.0915),
    ("MUST", "ResNet50+LSTM") -> Seq(0.6655, 0.8558, 0.9127, 0.0738),
    ("MUST", "ResNet17+Transformer") -> Seq(0.3325, 0.4828, 0.5548, 0.1272),
    ("MUST", "ResNet50+Transformer") -> Seq(0.3743, 0.4866, 0.5367, 0.1344),
    ("MUST", "TIRG+LSTM") -> Seq(0.4202, 0.7012, 0.8137, 0.1184),
    ("MUST", "TIRG+Transformer") -> Seq(0.3131, 0.4800, 0.5543, 0.1333),
    ("MUST", "CLIP+LSTM") -> Seq(0.5376, 0.7859, 0.8678, 0.1006),
    ("MUST", "CLIP+Transformer") -> Seq(0.4190, 0.5262, 0.5731, 0.1229),
  )

  private lazy val rows = TableRunners.tableIII(spark)

  test("Table III: print paper vs measured") {
    banner("Table III — accuracy on MIT-States analog")
    printAccuracy(rows, paper, Seq(1, 5, 10))
    assert(rows.size == 18)
  }

  test("Table III shape: best MUST beats best MR beats best JE at Recall@1") {
    val must = bestRecall(rows, "MUST", 1)
    val mr = bestRecall(rows, "MR", 1)
    val je = bestRecall(rows, "JE", 1)
    assert(must > mr, s"MUST=$must MR=$mr")
    assert(mr > je, s"MR=$mr JE=$je")
  }

  test("Table III shape: MUST beats MR per encoder for LSTM rows") {
    Seq("ResNet17+LSTM", "ResNet50+LSTM", "CLIP+LSTM").foreach { e =>
      assert(rowOf(rows, "MUST", e).recallAt(10) >= rowOf(rows, "MR", e).recallAt(10) - 0.02, e)
    }
  }

  test("Table III shape: LSTM (clean aux) rows beat Transformer (noisy aux) rows in MUST") {
    assert(rowOf(rows, "MUST", "ResNet50+LSTM").recallAt(1) >
      rowOf(rows, "MUST", "ResNet50+Transformer").recallAt(1))
    assert(rowOf(rows, "MUST", "ResNet17+LSTM").recallAt(1) >
      rowOf(rows, "MUST", "ResNet17+Transformer").recallAt(1))
  }

  test("Table III shape: multi-vector beats single-vector (MUST CLIP+LSTM > JE CLIP)") {
    assert(rowOf(rows, "MUST", "CLIP+LSTM").recallAt(1) > rowOf(rows, "JE", "CLIP").recallAt(1))
  }

  test("Table III shape: best MUST has the lowest SME") {
    val bestMustSme = rows.filter(_.framework == "MUST").map(_.sme).min
    assert(bestMustSme <= rows.filter(_.framework != "MUST").map(_.sme).min + 0.01)
  }
}
