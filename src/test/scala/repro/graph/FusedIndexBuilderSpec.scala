package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec
import repro.core.JointSimilarity
import repro.core.Types._
import repro.mmdata.MultiModalSynth

class FusedIndexBuilderSpec extends AnyFunSuite with SparkSpec {

  private val ds = DatasetConfig("idx", n = 300, nQueries = 20, m = 2, dim = 16,
    dLat = 8, nClusters = 15, tau = 0.35, seed = 31L)
  private val w = Array(0.5, 0.5)

  private lazy val objects = MultiModalSynth.objects(spark, ds).cache()
  private lazy val store = VectorStore.collect(objects)
  private lazy val index = FusedIndexBuilder.build(spark, store, w, IndexConfig(gamma = 8, epsilon = 2))

  test("index covers every object exactly once") {
    assert(index.n == ds.n)
  }

  test("no self-loops") {
    index.adjacency.zipWithIndex.foreach { case (ns, v) => assert(!ns.contains(v)) }
  }

  test("neighbors are valid vertex ids without duplicates") {
    index.adjacency.foreach { ns =>
      assert(ns.forall(u => u >= 0 && u < ds.n))
      assert(ns.toSet.size == ns.length)
    }
  }

  test("degrees respect gamma up to connectivity bridges") {
    // Bridges (component ⑤) may push a few vertices one past γ.
    val over = index.adjacency.count(_.length > 8)
    assert(index.maxDegree <= 8 + 3, s"max degree ${index.maxDegree}")
    assert(over <= ds.n / 10, s"$over vertices over gamma")
  }

  test("every vertex is reachable from the seed (component ⑤)") {
    val visited = new Array[Boolean](index.n)
    val q = new java.util.ArrayDeque[Int]()
    visited(index.seedVertex) = true; q.add(index.seedVertex)
    while (!q.isEmpty) {
      val v = q.poll()
      index.adjacency(v).foreach(u => if (!visited(u)) { visited(u) = true; q.add(u) })
    }
    assert(visited.forall(identity), s"${visited.count(!_)} unreachable vertices")
  }

  test("seed is the vertex closest to the centroid (component ④)") {
    val n = store.n
    val centroid = Array.tabulate(store.m) { i =>
      val acc = new Array[Double](ds.dim)
      (0 until n).foreach { v => val vec = store.vecs(v)(i); (0 until ds.dim).foreach(j => acc(j) += vec(j)) }
      acc.map(_ / n)
    }
    val best = (0 until n).maxBy(v => JointSimilarity.jointIP(w, centroid, store.vecs(v)))
    assert(index.seedVertex == best)
  }

  test("MRNG selection (Lemma 2): accepted neighbors are closer to o than to each other") {
    // For the *pre-bridge* graph, each accepted v must satisfy
    // IP(o,v) > IP(u,v) for every u accepted before it.
    val noBridge = FusedIndexBuilder.build(spark, store, w,
      IndexConfig(gamma = 8, epsilon = 2, ensureConnectivity = false))
    noBridge.adjacency.zipWithIndex.foreach { case (ns, o) =>
      ns.indices.foreach { i =>
        val v = ns(i)
        val ipOv = JointSimilarity.jointIP(w, store.vecs(o), store.vecs(v))
        (0 until i).foreach { j =>
          val u = ns(j)
          val ipUv = JointSimilarity.jointIP(w, store.vecs(u), store.vecs(v))
          assert(ipOv > ipUv,
            s"MRNG violated at o=$o v=$v u=$u: IP(o,v)=$ipOv <= IP(u,v)=$ipUv")
        }
      }
    }
  }

  test("graph quality improves with NNDescent iterations (Table XI shape)") {
    val exact = GraphQuality.exactNeighbors(spark, store, w, gamma = 8)
    def qualityAt(eps: Int): Double = {
      val idx = FusedIndexBuilder.build(spark, store, w,
        IndexConfig(gamma = 8, epsilon = eps, useMrngSelection = false, ensureConnectivity = false))
      GraphQuality.quality(idx.adjacency, exact, gamma = 8)
    }
    val q0 = qualityAt(0); val q2 = qualityAt(2)
    assert(q2 > q0 + 0.2, s"q0=$q0 q2=$q2")
    assert(q2 > 0.7, s"q2=$q2")
  }

  test("KGraph variant (no MRNG) keeps exactly gamma nearest candidates") {
    val kg = FusedIndexBuilder.build(spark, store, w,
      IndexConfig(gamma = 8, epsilon = 2, useMrngSelection = false, ensureConnectivity = false))
    assert(kg.adjacency.forall(_.length == 8))
  }

  test("MRNG prunes at least as aggressively as top-gamma") {
    val mrng = FusedIndexBuilder.build(spark, store, w,
      IndexConfig(gamma = 8, epsilon = 2, ensureConnectivity = false))
    val avgDeg = mrng.adjacency.map(_.length).sum.toDouble / mrng.n
    assert(avgDeg <= 8.0)
  }

  test("build is deterministic") {
    val a = FusedIndexBuilder.build(spark, store, w, IndexConfig(gamma = 6, epsilon = 1))
    val b = FusedIndexBuilder.build(spark, store, w, IndexConfig(gamma = 6, epsilon = 1))
    assert(a.seedVertex == b.seedVertex)
    assert(a.adjacency.map(_.toSeq).toSeq == b.adjacency.map(_.toSeq).toSeq)
  }

  test("weights shape the graph: one-hot and balanced weights differ") {
    val oneHot = FusedIndexBuilder.build(spark, store, Array(1.0, 0.0), IndexConfig(gamma = 6, epsilon = 2))
    val fused = FusedIndexBuilder.build(spark, store, Array(0.5, 0.5), IndexConfig(gamma = 6, epsilon = 2))
    assert(oneHot.adjacency.map(_.toSeq).toSeq != fused.adjacency.map(_.toSeq).toSeq)
  }

  test("build rejects degenerate inputs") {
    val tiny = new VectorStore(Array(Array(Array(1.0))))
    intercept[IllegalArgumentException](FusedIndexBuilder.build(spark, tiny, Array(1.0)))
  }

  test("mrngSelect caps output at gamma and skips self") {
    val ids = Array(1, 2, 0, 3)
    val ips = Array(0.9, 0.8, 0.7, 0.6)
    val sel = FusedIndexBuilder.mrngSelect(0, ids, ips, gamma = 2, store, Array(0.5, 0.5))
    assert(sel.length <= 2)
    assert(!sel.contains(0))
  }
}
