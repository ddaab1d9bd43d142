package repro.bench

import repro.eval.TableRunners

/** Table XXI (App. M) — search accuracy on the Shopping (Bottoms) analog:
  * a second category of the Shopping dataset confirming the Table V
  * pattern with shared weight behaviour. */
class TableXXIBench extends BenchSpec {

  val paper: Map[(String, String), Seq[Double]] = Map(
    ("JE", "TIRG") -> Seq(0.0905, 0.2715, 0.3924),
    ("MR", "ResNet17+Encoding") -> Seq(0.0107, 0.0551, 0.0995),
    ("MR", "TIRG+Encoding") -> Seq(0.0596, Double.NaN, 0.3850),
    ("MUST", "ResNet17+Encoding") -> Seq(Double.NaN, Double.NaN, 0.8887),
    ("MUST", "TIRG+Encoding") -> Seq(0.4784, 0.8162, 0.8999),
  )

  private lazy val rows = TableRunners.tableXXI(spark)

  test("Table XXI: print paper vs measured") {
    banner("Table XXI — accuracy on Shopping (Bottoms) analog")
    printAccuracy(rows, paper, Seq(1, 5, 10))
    assert(rows.size == 5)
  }

  test("Table XXI shape: MUST dominates both baselines at R@10") {
    val must = bestRecall(rows, "MUST", 10)
    assert(must > bestRecall(rows, "MR", 10))
    assert(must > bestRecall(rows, "JE", 10))
  }

  test("Table XXI shape: MR with raw image encoder collapses here too") {
    assert(rowOf(rows, "MR", "ResNet17+Encoding").recallAt(1) < 0.15)
  }

  test("Table XXI shape: the Bottoms category mirrors the T-shirt pattern (shared weights)") {
    rows.filter(_.framework == "MUST").foreach { r =>
      assert(r.learnedWeights(1) > r.learnedWeights(0), s"${r.encoder}: ${r.learnedWeights}")
    }
  }
}
