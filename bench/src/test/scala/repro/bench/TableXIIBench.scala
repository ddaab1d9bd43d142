package repro.bench

import repro.eval.TableRunners

/** Table XII (App. I) — Recall@10(10) and response time vs the result-set
  * size l. Paper (n = 1M, γ = 30): l = 700..4000 gives recall 0.506 →
  * 0.973 and response time 5 → 35 ms. Our ladder is scaled to n = 8k. */
class TableXIIBench extends BenchSpec {

  val paperRecall = Map(700 -> 0.5061, 1000 -> 0.63726, 1500 -> 0.76619,
    2000 -> 0.85625, 4000 -> 0.97331)
  val paperMs = Map(700 -> 5.0, 1000 -> 7.0, 1500 -> 11.0, 2000 -> 15.0, 4000 -> 35.0)

  private lazy val rows = TableRunners.tableXII(spark)

  test("Table XII: print paper vs measured") {
    banner("Table XII — search performance vs result-set size l")
    println("paper-l ours-l  recall paper|ours    paper ms  ours batch ms  dots/query")
    rows.foreach { case (pl, ol, r) =>
      println(f"$pl%-7d $ol%-7d ${paperRecall(pl)}%.4f|${r.recall}%.4f   ${paperMs(pl)}%6.0f    ${r.batchMs}%10.0f   ${r.dotsPerQuery}%d")
    }
    assert(rows.size == 5)
  }

  test("Table XII shape: recall increases monotonically with l") {
    val recalls = rows.map(_._3.recall)
    recalls.sliding(2).foreach {
      case Seq(a, b) => assert(b >= a - 1e-9, s"recall dropped: $recalls")
      case _         => ()
    }
  }

  test("Table XII shape: work per query increases with l") {
    val dots = rows.map(_._3.dotsPerQuery)
    assert(dots.last > dots.head * 2, s"dots: $dots")
  }

  test("Table XII shape: the largest l reaches high recall (paper: 0.973)") {
    assert(rows.last._3.recall > 0.95, s"recall=${rows.last._3.recall}")
  }

  test("Table XII shape: the smallest l trades recall for speed") {
    assert(rows.head._3.recall < rows.last._3.recall)
    assert(rows.head._3.dotsPerQuery < rows.last._3.dotsPerQuery)
  }
}
