package repro.bench

import repro.eval.TableRunners

/** Table XI (App. H) — NNDescent graph quality vs iterations ε on the
  * ImageText/AudioText/VideoText analogs.
  * Paper: ε=1 ≈ 0.009, ε=2 ≈ 0.78–0.79, ε=3 = 0.99 on all three. */
class TableXIBench extends BenchSpec {

  val paper: Map[(String, Int), Double] = Map(
    ("ImageText1M", 1) -> 0.0094, ("ImageText1M", 2) -> 0.7795, ("ImageText1M", 3) -> 0.9900,
    ("AudioText1M", 1) -> 0.0088, ("AudioText1M", 2) -> 0.7945, ("AudioText1M", 3) -> 0.9900,
    ("VideoText1M", 1) -> 0.0096, ("VideoText1M", 2) -> 0.7842, ("VideoText1M", 3) -> 0.9900,
  )

  private lazy val rows = TableRunners.tableXI(spark)

  test("Table XI: print paper vs measured graph quality") {
    banner("Table XI — graph quality vs NNDescent iterations")
    println("dataset        eps  paper   ours")
    rows.foreach(r =>
      println(f"${r.dataset}%-14s ${r.epsilon}%-4d ${paper((r.dataset, r.epsilon))}%.4f  ${r.quality}%.4f"))
    assert(rows.size == 9)
  }

  test("Table XI shape: quality increases strictly with eps on every dataset") {
    rows.groupBy(_.dataset).foreach { case (d, rs) =>
      val sorted = rs.sortBy(_.epsilon).map(_.quality)
      assert(sorted(0) < sorted(1) && sorted(1) < sorted(2), s"$d: $sorted")
    }
  }

  test("Table XI shape: three iterations reach high quality (paper: 0.99)") {
    rows.filter(_.epsilon == 3).foreach(r => assert(r.quality > 0.85, s"${r.dataset}: ${r.quality}"))
  }

  test("Table XI shape: one iteration is still far from converged") {
    rows.filter(_.epsilon == 1).foreach(r => assert(r.quality < 0.8, s"${r.dataset}: ${r.quality}"))
  }
}
