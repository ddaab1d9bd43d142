package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec
import repro.core.{JointSimilarity, VecOps}
import repro.core.Types._
import repro.mmdata.MultiModalSynth

class GraphQualitySpec extends AnyFunSuite with SparkSpec {

  private val ds = DatasetConfig("gq", n = 200, nQueries = 10, m = 2, dim = 12,
    dLat = 8, nClusters = 10, tau = 0.35, seed = 91L)
  private val w = Array(0.5, 0.5)

  private lazy val store = VectorStore.collect(MultiModalSynth.objects(spark, ds))
  private lazy val exact = GraphQuality.exactNeighbors(spark, store, w, gamma = 6)

  test("exactNeighbors returns gamma neighbors per vertex, no self") {
    assert(exact.length == ds.n)
    exact.zipWithIndex.foreach { case (ns, o) =>
      assert(ns.length == 6)
      assert(!ns.contains(o))
      assert(ns.toSet.size == 6)
    }
  }

  test("exactNeighbors matches a driver-side naive computation") {
    (0 until 10).foreach { o =>
      val naive = (0 until store.n).filter(_ != o)
        .map(v => (JointSimilarity.jointIP(w, store.vecs(o), store.vecs(v)), v))
        .sortBy { case (ip, v) => (-ip, v) }
        .take(6).map(_._2).toSet
      assert(exact(o).toSet == naive, s"vertex $o")
    }
  }

  test("quality of the exact graph is 1") {
    assert(GraphQuality.quality(exact, exact, 6) == 1.0)
  }

  test("quality of a shifted graph is below 1") {
    val shifted = exact.map(ns => ns.map(v => (v + 1) % store.n))
    assert(GraphQuality.quality(shifted, exact, 6) < 1.0)
  }

  test("quality of random lists is near zero") {
    val rnd = Array.tabulate(store.n) { o =>
      Array.tabulate(6)(j => math.floorMod(VecOps.mix64(o * 31 + j), store.n.toLong).toInt)
    }
    assert(GraphQuality.quality(rnd, exact, 6) < 0.2)
  }

  test("quality rejects mismatched graph sizes") {
    intercept[IllegalArgumentException](GraphQuality.quality(exact.take(3), exact, 6))
  }
}
