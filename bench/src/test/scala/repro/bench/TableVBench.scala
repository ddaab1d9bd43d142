package repro.bench

import repro.eval.TableRunners

/** Table V — search accuracy on the Shopping (T-shirt) analog: the dataset
  * where MR collapses because the image modality alone is uninformative. */
class TableVBench extends BenchSpec {

  val paper: Map[(String, String), Seq[Double]] = Map(
    ("JE", "TIRG") -> Seq(0.1320, 0.4005, 0.5162, 0.0964),
    ("MR", "ResNet17+Encoding") -> Seq(0.0027, 0.0190, 0.0399, 0.1379),
    ("MR", "TIRG+Encoding") -> Seq(0.1320, 0.4015, 0.5206, 0.0964),
    ("MUST", "ResNet17+Encoding") -> Seq(0.4208, 0.6931, 0.7973, 0.0743),
    ("MUST", "TIRG+Encoding") -> Seq(0.4669, 0.7585, 0.8507, 0.0651),
  )

  private lazy val rows = TableRunners.tableV(spark)

  test("Table V: print paper vs measured") {
    banner("Table V — accuracy on Shopping (T-shirt) analog")
    printAccuracy(rows, paper, Seq(1, 5, 10))
    assert(rows.size == 5)
  }

  test("Table V shape: MR with raw image encoder collapses (paper: R@1 = 0.0027)") {
    assert(rowOf(rows, "MR", "ResNet17+Encoding").recallAt(1) < 0.15)
  }

  test("Table V shape: MUST lifts the same encoders far above MR") {
    Seq("ResNet17+Encoding", "TIRG+Encoding").foreach { e =>
      val must = rowOf(rows, "MUST", e).recallAt(10)
      val mr = rowOf(rows, "MR", e).recallAt(10)
      assert(must > mr + 0.1, s"$e: MUST=$must MR=$mr")
    }
    // The raw-image row is where the paper's gap is widest (0.7973 vs 0.0399).
    assert(rowOf(rows, "MUST", "ResNet17+Encoding").recallAt(10) >
      rowOf(rows, "MR", "ResNet17+Encoding").recallAt(10) + 0.3)
  }

  test("Table V shape: best MUST beats JE by a large factor (paper: 253% at R@1)") {
    assert(bestRecall(rows, "MUST", 1) > 2.0 * bestRecall(rows, "JE", 1))
  }

  test("Table V shape: learned weights are strongly aux-dominant (paper App. K)") {
    rows.filter(_.framework == "MUST").foreach { r =>
      assert(r.learnedWeights(1) > r.learnedWeights(0), s"${r.encoder}: ${r.learnedWeights}")
    }
    // The raw-image row's weight split is extreme (paper: 0.026 vs 1.212).
    val r17 = rowOf(rows, "MUST", "ResNet17+Encoding")
    assert(r17.learnedWeights(1) > 2.0 * r17.learnedWeights(0), s"${r17.learnedWeights}")
  }
}
