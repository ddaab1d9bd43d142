package repro.bench

import repro.eval.TableRunners

/** Table IX — user-defined weights on MIT-States: raising ω₀² makes the
  * returned object more similar to the query in modality 0 and less in
  * modality 1. Paper row (modality 1): 0.9999 / 0.9960 / 0.9748 / 0.9242 /
  * 0.8525; modality-0 mean IP at ω₀²=0.5 is 0.6915. */
class TableIXBench extends BenchSpec {

  val paperIp1 = Seq(0.9999, 0.9960, 0.9748, 0.9242, 0.8525)

  private lazy val rows = TableRunners.tableIX(spark)

  test("Table IX: print paper vs measured") {
    banner("Table IX — user-defined weights (MIT-States analog)")
    println("w0^2  w1^2  IP(mod0) ours   IP(mod1) paper|ours")
    rows.zip(paperIp1).foreach { case (r, p1) =>
      println(f"${r.w0}%.1f   ${r.w1}%.1f   ${r.ip0}%.4f         $p1%.4f|${r.ip1}%.4f")
    }
    assert(rows.size == 5)
  }

  test("Table IX shape: IP in modality 0 increases with its weight") {
    assert(rows.last.ip0 > rows.head.ip0,
      s"ip0 at w0=0.5: ${rows.head.ip0}, at 0.9: ${rows.last.ip0}")
  }

  test("Table IX shape: IP in modality 1 decreases as its weight shrinks") {
    assert(rows.last.ip1 < rows.head.ip1,
      s"ip1 at w1=0.5: ${rows.head.ip1}, at 0.1: ${rows.last.ip1}")
  }

  test("Table IX shape: customization is monotone across the sweep") {
    rows.sliding(2).foreach {
      case Seq(a, b) =>
        assert(b.ip0 >= a.ip0 - 0.02, s"ip0 dropped: $a -> $b")
        assert(b.ip1 <= a.ip1 + 0.02, s"ip1 rose: $a -> $b")
      case _ => ()
    }
  }
}
