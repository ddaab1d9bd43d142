package repro.baseline

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec
import repro.core.Types._
import repro.eval.Metrics
import repro.graph.{FusedIndexBuilder, VectorStore}
import repro.mmdata.MultiModalSynth

class MrJeSpec extends AnyFunSuite with SparkSpec {

  private val ds = DatasetConfig("mrje", n = 400, nQueries = 50, m = 2, dim = 16,
    dLat = 8, nClusters = 20, tau = 0.35, seed = 71L)
  private val enc = EncoderConfig("enc", targetNoise = 0.7, auxNoises = Seq(0.5),
    compNoise = 0.8)
  private val idxCfg = IndexConfig(gamma = 10, epsilon = 3)

  private lazy val objects = MultiModalSynth.objects(spark, ds).cache()
  private lazy val store = VectorStore.collect(objects)
  private lazy val oneHot = (0 until ds.m).map(i =>
    FusedIndexBuilder.build(spark, store, MultiStreamRetrieval.oneHot(ds.m, i), idxCfg))
  private lazy val queries = MultiModalSynth.queries(spark, ds, enc).cache()

  test("oneHot builds a proper basis vector") {
    assert(MultiStreamRetrieval.oneHot(3, 1).toSeq == Seq(0.0, 1.0, 0.0))
  }

  test("MR returns at most k unique results per query") {
    val res = MultiStreamRetrieval.search(queries, oneHot, store, k = 10, l = 40).collect()
    assert(res.length == ds.nQueries)
    res.foreach { r =>
      assert(r.results.length <= 10)
      assert(r.results.toSet.size == r.results.length)
    }
  }

  test("MR intersection size is bounded by the per-modality list size") {
    val res = MultiStreamRetrieval.search(queries, oneHot, store, k = 10, l = 40).collect()
    res.foreach(r => assert(r.interSize <= 40))
  }

  test("MR with a single active modality degenerates to that modality's search") {
    val masked = MultiModalSynth.queries(spark, ds, enc, mask = Seq(true, false))
    val res = MultiStreamRetrieval.search(masked, oneHot, store, k = 5, l = 30).collect()
    val qs = masked.collect().map(q => q.qid -> q).toMap
    res.foreach { r =>
      val qv = qs(r.qid).vecs.map(_.toArray).toArray
      val (expect, _, _, _, _) = repro.graph.JointSearch.searchKernel(
        qv, r.qid, MultiStreamRetrieval.oneHot(2, 0), oneHot(0), store, SearchConfig(k = 30, l = 30))
      assert(r.results.toSeq == expect.take(5).map(_.toLong).toSeq)
    }
  }

  test("MR rejects queries with no active modality") {
    val q = MMQuery(0L, 0L, Seq(Seq.empty, Seq.empty), Seq.empty)
    intercept[IllegalArgumentException](
      MultiStreamRetrieval.mergeKernel(q, oneHot.toArray, store, 5, 20))
  }

  test("JE searches the composition vector on the target index") {
    val res = JointEmbeddingSearch.search(queries, oneHot.head, store, ds.m,
      SearchConfig(k = 10, l = 40)).collect()
    assert(res.length == ds.nQueries)
    res.foreach(r => assert(r.results.length == 10))
  }

  test("JE fails fast when the encoder has no composition head") {
    val noComp = MultiModalSynth.queries(spark, ds, enc.copy(compNoise = Double.NaN))
    intercept[Exception] {
      JointEmbeddingSearch.search(noComp, oneHot.head, store, ds.m,
        SearchConfig(k = 5, l = 20)).collect()
    }
  }

  test("MR recall is capped by its weakest modality; fused search beats it here") {
    // Joint (fused) search with balanced weights vs MR on the same data.
    val fused = FusedIndexBuilder.build(spark, store, Array(0.5, 0.5), idxCfg)
    val mr = MultiStreamRetrieval.search(queries, oneHot, store, k = 10, l = 40).collect()
    val must = repro.graph.JointSearch.search(queries, fused, store, Array(0.5, 0.5),
      SearchConfig(k = 10, l = 40)).collect()
    val mrRecall = Metrics.recallSingleGt(mr.map(r => (r.gt, r.results)).toSeq, 10)
    val mustRecall = Metrics.recallSingleGt(must.map(r => (r.gt, r.results)).toSeq, 10)
    assert(mustRecall >= mrRecall, s"must=$mustRecall mr=$mrRecall")
  }
}
