package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec
import repro.eval.AccuracyHarness

/** Base for the per-table benchmark suites: shared SparkSession, a
  * paper-vs-measured printer, and shape assertions over accuracy grids.
  *
  * Benchmarks print every measured row next to the paper's number (the
  * same pairs are recorded in EXPERIMENTS.md) and assert the paper's
  * *qualitative* claims — ordering between frameworks, monotonicity in
  * parameters — not absolute values (our substrate is a synthetic-noise
  * simulator, DESIGN.md §1).
  */
trait BenchSpec extends AnyFunSuite with SparkSpec {

  def banner(title: String): Unit = {
    println()
    println("=" * 78)
    println(s"  $title")
    println("=" * 78)
  }

  /** Prints `[paper X | measured Y]` rows for an accuracy grid. */
  def printAccuracy(rows: Seq[AccuracyHarness.Row],
                    paper: Map[(String, String), Seq[Double]],
                    ks: Seq[Int]): Unit = {
    val header = ks.map(k => f"R@$k%-3d (paper|ours)").mkString("  ")
    println(f"${"framework"}%-6s ${"encoder"}%-28s $header  SME (paper|ours)")
    rows.foreach { r =>
      val p = paper.get((r.framework, r.encoder))
      def fmtP(i: Int): String = p.flatMap(_.lift(i)).map(v => f"$v%.4f").getOrElse("  n/a ")
      val cells = ks.indices.map(i => s"${fmtP(i)}|${f"${r.recalls(i)._2}%.4f"}").mkString("  ")
      val smeP = fmtP(ks.length)
      println(f"${r.framework}%-6s ${r.encoder.take(28)}%-28s $cells  $smeP|${f"${r.sme}%.4f"}")
    }
  }

  def rowOf(rows: Seq[AccuracyHarness.Row], fw: String, enc: String): AccuracyHarness.Row =
    rows.find(r => r.framework == fw && r.encoder == enc)
      .getOrElse(fail(s"missing row $fw/$enc"))

  def bestRecall(rows: Seq[AccuracyHarness.Row], fw: String, k: Int): Double =
    rows.filter(_.framework == fw).map(_.recallAt(k)).max
}
