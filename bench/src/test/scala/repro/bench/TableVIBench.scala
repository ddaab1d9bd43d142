package repro.bench

import repro.eval.TableRunners

/** Table VI — search accuracy on the MS-COCO analog (m = 3, the hardest
  * setting; Recall@{10,50,100}(1)). */
class TableVIBench extends BenchSpec {

  val paper: Map[(String, String), Seq[Double]] = Map(
    ("JE", "MPC") -> Seq(0.0202, 0.0865, 0.1512),
    ("MR", "MPC+GRU+ResNet50") -> Seq(Double.NaN, 0.1827, 0.2741),
    ("MR", "ResNet50+GRU+ResNet50") -> Seq(0.0493, 0.1633, 0.2425),
    ("MUST", "MPC+GRU+ResNet50") -> Seq(0.0825, 0.2272, 0.3363),
    ("MUST", "ResNet50+GRU+ResNet50") -> Seq(0.0914, 0.2498, 0.3711),
  )

  private lazy val rows = TableRunners.tableVI(spark)

  test("Table VI: print paper vs measured") {
    banner("Table VI — accuracy on MS-COCO analog (m = 3)")
    printAccuracy(rows, paper, Seq(10, 50, 100))
    assert(rows.size == 5)
  }

  test("Table VI shape: JE struggles with three fused modalities") {
    assert(rowOf(rows, "JE", "MPC").recallAt(10) < bestRecall(rows, "MUST", 10))
  }

  test("Table VI shape: MUST beats MR for both encoder combos at R@100") {
    Seq("MPC+GRU+ResNet50", "ResNet50+GRU+ResNet50").foreach { e =>
      assert(rowOf(rows, "MUST", e).recallAt(100) > rowOf(rows, "MR", e).recallAt(100), e)
    }
  }

  test("Table VI shape: recall grows with k within every row") {
    rows.foreach { r =>
      assert(r.recallAt(10) <= r.recallAt(50) + 1e-9)
      assert(r.recallAt(50) <= r.recallAt(100) + 1e-9)
    }
  }
}
