package repro.bench

import repro.eval.TableRunners

/** Table VIII — recall vs number of modalities (CelebA+ analog, m = 2..4).
  * The paper's numeric cells are not in the source text; its claims are:
  * recall grows with m for both methods overall, and MR's merging pain
  * grows with m (its m = 4 recall drops below m = 3). */
class TableVIIIBench extends BenchSpec {

  private lazy val rows = TableRunners.tableVIII(spark)

  test("Table VIII: print measured recall vs m") {
    banner("Table VIII — recall vs number of modalities (CelebA+ analog)")
    println("m    MUST R@10   MR R@10")
    rows.foreach(r => println(f"${r.m}%-4d ${r.mustRecall10}%.4f      ${r.mrRecall10}%.4f"))
    assert(rows.map(_.m) == Seq(2, 3, 4))
  }

  test("Table VIII shape: MUST recall does not degrade when modalities are added") {
    assert(rows.last.mustRecall10 >= rows.head.mustRecall10 - 0.05,
      s"m=2: ${rows.head.mustRecall10}, m=4: ${rows.last.mustRecall10}")
  }

  test("Table VIII shape: MUST beats MR at every m") {
    rows.foreach(r => assert(r.mustRecall10 > r.mrRecall10, s"m=${r.m}"))
  }

  test("Table VIII shape: MR's merging advantage shrinks (or reverses) as m grows") {
    // Paper: MR at m=4 is lower than at m=3 — the intersection gets harder.
    val m3 = rows.find(_.m == 3).get.mrRecall10
    val m4 = rows.find(_.m == 4).get.mrRecall10
    assert(m4 <= m3 + 0.05, s"MR m=3: $m3, m=4: $m4")
  }
}
