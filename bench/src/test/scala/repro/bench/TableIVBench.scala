package repro.bench

import repro.eval.TableRunners

/** Table IV — search accuracy on the CelebA analog. */
class TableIVBench extends BenchSpec {

  // Paper cells missing in the source text are omitted (printed as n/a).
  val paper: Map[(String, String), Seq[Double]] = Map(
    ("JE", "TIRG") -> Seq(0.2725, 0.5258, 0.6220, 0.1896),
    ("JE", "CLIP") -> Seq(0.3644, 0.7006, 0.7789, 0.1453),
    ("MR", "ResNet17+Encoding") -> Seq(Double.NaN, 0.5477, 0.6233, 0.1724),
    ("MR", "ResNet50+Encoding") -> Seq(0.3098, 0.5029, 0.5717, 0.2047),
    ("MR", "TIRG+Encoding") -> Seq(0.3275, 0.5707, Double.NaN, 0.1875),
    ("MR", "CLIP+Encoding") -> Seq(0.4578, 0.7319, 0.7990, 0.1416),
    ("MUST", "ResNet17+Encoding") -> Seq(0.5701, 0.7888, 0.8446, 0.1087),
    ("MUST", "ResNet50+Encoding") -> Seq(0.5423, 0.7539, 0.8106, 0.1293),
    ("MUST", "TIRG+Encoding") -> Seq(0.4932, Double.NaN, Double.NaN, 0.1433),
    ("MUST", "CLIP+Encoding") -> Seq(0.6388, 0.8583, 0.9024, 0.0952),
  )

  private lazy val rows = TableRunners.tableIV(spark)

  test("Table IV: print paper vs measured") {
    banner("Table IV — accuracy on CelebA analog")
    printAccuracy(rows, paper, Seq(1, 5, 10))
    assert(rows.size == 10)
  }

  test("Table IV shape: best MUST beats best MR beats best JE at Recall@1") {
    assert(bestRecall(rows, "MUST", 1) > bestRecall(rows, "MR", 1))
    assert(bestRecall(rows, "MR", 1) > bestRecall(rows, "JE", 1))
  }

  test("Table IV shape: CLIP+Encoding is the best MUST row (paper's winner)") {
    val best = rows.filter(_.framework == "MUST").maxBy(_.recallAt(1))
    assert(best.encoder == "CLIP+Encoding", s"winner was ${best.encoder}")
  }

  test("Table IV shape: MUST beats MR for every encoder") {
    Seq("ResNet17+Encoding", "ResNet50+Encoding", "TIRG+Encoding", "CLIP+Encoding").foreach { e =>
      assert(rowOf(rows, "MUST", e).recallAt(1) > rowOf(rows, "MR", e).recallAt(1), s"$e @1")
      assert(rowOf(rows, "MUST", e).recallAt(10) >= rowOf(rows, "MR", e).recallAt(10) - 0.01, s"$e @10")
    }
  }

  test("Table IV shape: learned weights are text-dominant (paper App. K)") {
    rows.filter(_.framework == "MUST").foreach { r =>
      assert(r.learnedWeights(1) > r.learnedWeights(0),
        s"${r.encoder}: ${r.learnedWeights}")
    }
  }
}
