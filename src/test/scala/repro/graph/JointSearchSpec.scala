package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec
import repro.baseline.BruteForceSearch
import repro.core.Types._
import repro.eval.Metrics
import repro.mmdata.MultiModalSynth

class JointSearchSpec extends AnyFunSuite with SparkSpec {

  private val ds = DatasetConfig("js", n = 400, nQueries = 50, m = 2, dim = 16,
    dLat = 8, nClusters = 20, tau = 0.35, seed = 51L)
  private val enc = EncoderConfig("enc", targetNoise = 0.7, auxNoises = Seq(0.5))
  private val w = Array(0.5, 0.5)

  private lazy val objects = MultiModalSynth.objects(spark, ds).cache()
  private lazy val store = VectorStore.collect(objects)
  private lazy val index = FusedIndexBuilder.build(spark, store, w, IndexConfig(gamma = 10, epsilon = 3))
  private lazy val queries = MultiModalSynth.queries(spark, ds, enc).cache()
  private lazy val exact = BruteForceSearch.topK(queries.collect(), objects, w, k = 10)

  test("search returns k results, unique valid ids, for every query") {
    val res = JointSearch.search(queries, index, store, w, SearchConfig(k = 10, l = 40)).collect()
    assert(res.length == ds.nQueries)
    res.foreach { r =>
      assert(r.results.length == 10)
      assert(r.results.toSet.size == 10)
      r.results.foreach(id => assert(id >= 0 && id < ds.n))
    }
  }

  test("results are ordered by descending joint IP") {
    val qs = queries.collect()
    val res = JointSearch.search(queries, index, store, w, SearchConfig(k = 10, l = 40)).collect()
    val byQid = qs.map(q => q.qid -> q).toMap
    res.foreach { r =>
      val qv = byQid(r.qid).vecs.map(_.toArray).toArray
      val ips = r.results.map(id => repro.core.JointSimilarity.jointIP(w, qv, store.vecs(id.toInt)))
      assert(ips == ips.sortBy(-_), s"unsorted result IPs for query ${r.qid}: $ips")
    }
  }

  test("graph search approaches exact search (Recall@10(10) high at moderate l)") {
    val res = JointSearch.search(queries, index, store, w, SearchConfig(k = 10, l = 80)).collect()
    val gtSets = exact.map(e => e.qid -> e.results.toSet).toMap
    val recall = Metrics.recallAgainstSets(res.map(r => (r.results, gtSets(r.qid))).toSeq, 10)
    assert(recall > 0.9, s"recall=$recall")
  }

  test("larger l does not hurt recall (Table XII shape)") {
    val gtSets = exact.map(e => e.qid -> e.results.toSet).toMap
    def recallAt(l: Int): Double = {
      val res = JointSearch.search(queries, index, store, w, SearchConfig(k = 10, l = l)).collect()
      Metrics.recallAgainstSets(res.map(r => (r.results, gtSets(r.qid))).toSeq, 10)
    }
    val rSmall = recallAt(15)
    val rLarge = recallAt(120)
    assert(rLarge >= rSmall - 1e-9, s"l=15: $rSmall, l=120: $rLarge")
    assert(rLarge > 0.95, s"rLarge=$rLarge")
  }

  test("Lemma 4: partial-distance pruning returns bit-identical results") {
    val withOpt = JointSearch.search(queries, index, store, w,
      SearchConfig(k = 10, l = 60, usePartialDistance = true)).collect().sortBy(_.qid)
    val without = JointSearch.search(queries, index, store, w,
      SearchConfig(k = 10, l = 60, usePartialDistance = false)).collect().sortBy(_.qid)
    assert(withOpt.map(_.results).toSeq == without.map(_.results).toSeq)
  }

  test("Lemma 4: pruning saves modality dot products") {
    val withOpt = JointSearch.search(queries, index, store, w,
      SearchConfig(k = 10, l = 60, usePartialDistance = true)).collect()
    val without = JointSearch.search(queries, index, store, w,
      SearchConfig(k = 10, l = 60, usePartialDistance = false)).collect()
    assert(withOpt.map(_.dotProducts).sum < without.map(_.dotProducts).sum)
    assert(withOpt.map(_.prunedObjects).sum > 0)
  }

  test("Lemma 3: f(eta) — sum of R's IPs — is monotonically non-decreasing") {
    val qs = queries.collect().take(10)
    qs.foreach { q =>
      val qv = q.vecs.map(_.toArray).toArray
      val (_, _, _, _, fEta) =
        JointSearch.searchKernel(qv, q.qid, w, index, store, SearchConfig(k = 10, l = 40))
      fEta.sliding(2).foreach {
        case Array(a, b) => assert(b >= a - 1e-9, s"f(eta) decreased: $a -> $b")
        case _           => ()
      }
    }
  }

  test("search visits far fewer objects than a full scan (index-pruned scan)") {
    val res = JointSearch.search(queries, index, store, w, SearchConfig(k = 10, l = 40)).collect()
    val avgDots = res.map(_.dotProducts).sum.toDouble / res.length
    val fullScanDots = ds.n * ds.m
    assert(avgDots < fullScanDots / 2.0, s"avgDots=$avgDots vs full=$fullScanDots")
  }

  test("missing aux modality (t < m) still searches on the target slot alone") {
    val masked = MultiModalSynth.queries(spark, ds, enc, mask = Seq(true, false))
    val res = JointSearch.search(masked, index, store, w, SearchConfig(k = 5, l = 30)).collect()
    assert(res.forall(_.results.length == 5))
  }

  test("search with l capped by n still terminates") {
    val res = JointSearch.search(queries.limit(3), index, store, w,
      SearchConfig(k = 10, l = 10000)).collect()
    assert(res.forall(_.results.length == 10))
  }

  test("search is deterministic") {
    val a = JointSearch.search(queries, index, store, w, SearchConfig(k = 10, l = 40))
      .collect().sortBy(_.qid).map(_.results)
    val b = JointSearch.search(queries, index, store, w, SearchConfig(k = 10, l = 40))
      .collect().sortBy(_.qid).map(_.results)
    assert(a.toSeq == b.toSeq)
  }
}
