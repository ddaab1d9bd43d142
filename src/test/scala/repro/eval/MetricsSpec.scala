package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.VectorStore

class MetricsSpec extends AnyFunSuite {

  private val store = new VectorStore(Array(
    Array(Array(1.0, 0.0), Array(1.0, 0.0)),
    Array(Array(0.0, 1.0), Array(0.0, 1.0)),
    Array(Array(math.sqrt(0.5), math.sqrt(0.5)), Array(1.0, 0.0)),
  ))

  test("recallSingleGt counts hits within the first k") {
    val rs = Seq((1L, Seq(1L, 2L)), (0L, Seq(2L, 0L)), (2L, Seq(0L, 1L)))
    assert(Metrics.recallSingleGt(rs, 1) === 1.0 / 3)
    assert(Metrics.recallSingleGt(rs, 2) === 2.0 / 3)
  }

  test("recallSingleGt rejects empty input") {
    intercept[IllegalArgumentException](Metrics.recallSingleGt(Nil, 1))
  }

  test("recallAgainstSets averages per-query overlap ratios") {
    val rs = Seq(
      (Seq(1L, 2L, 3L), Set(1L, 2L)),   // 2/2
      (Seq(4L, 5L, 6L), Set(1L, 2L)),   // 0/2
    )
    assert(Metrics.recallAgainstSets(rs, 3) === 0.5)
  }

  test("recallAgainstSets truncates at k before intersecting") {
    val rs = Seq((Seq(9L, 1L), Set(1L)))
    assert(Metrics.recallAgainstSets(rs, 1) === 0.0)
    assert(Metrics.recallAgainstSets(rs, 2) === 1.0)
  }

  test("recallAgainstSets rejects an empty ground-truth set") {
    intercept[IllegalArgumentException](
      Metrics.recallAgainstSets(Seq((Seq(1L), Set.empty[Long])), 1))
  }

  test("meanSme is 0 for perfect top-1 and 1 for orthogonal top-1") {
    assert(math.abs(Metrics.meanSme(Seq((0L, Seq(0L))), store)) < 1e-12)
    assert(math.abs(Metrics.meanSme(Seq((0L, Seq(1L))), store) - 1.0) < 1e-12)
  }

  test("meanSme averages over queries and penalizes empty results") {
    val v = Metrics.meanSme(Seq((0L, Seq(0L)), (0L, Seq.empty)), store)
    assert(math.abs(v - 0.5) < 1e-12)
  }

  test("meanModalityIp reads the requested modality of the top-1 result") {
    val qv = Array(Array(1.0, 0.0), Array(0.0, 1.0))
    val v0 = Metrics.meanModalityIp(Seq((qv, Seq(2L))), store, modality = 0)
    assert(math.abs(v0 - math.sqrt(0.5)) < 1e-12)
    val v1 = Metrics.meanModalityIp(Seq((qv, Seq(2L))), store, modality = 1)
    assert(math.abs(v1 - 0.0) < 1e-12)
  }

  test("qps computes queries per second") {
    assert(Metrics.qps(100, 2000.0) === 50.0)
    assert(Metrics.qps(5, 0.0).isPosInfinity)
  }

  test("timed returns the block result and a non-negative duration") {
    val (r, ms) = Metrics.timed { Thread.sleep(5); 42 }
    assert(r == 42)
    assert(ms >= 4.0)
  }
}
