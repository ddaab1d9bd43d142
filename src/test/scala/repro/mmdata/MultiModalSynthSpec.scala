package repro.mmdata

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec
import repro.core.VecOps
import repro.core.Types._

class MultiModalSynthSpec extends AnyFunSuite with SparkSpec {

  private val ds = DatasetConfig("test", n = 200, nQueries = 40, m = 2, dim = 16,
    dLat = 8, nClusters = 10, tau = 0.35, seed = 11L)
  private val enc = EncoderConfig("enc", targetNoise = 0.8, auxNoises = Seq(0.5))
  private val compEnc = EncoderConfig("comp", targetNoise = 0.8, auxNoises = Seq(0.5),
    compNoise = 0.9, targetIsComposition = true)

  test("objects: n rows with contiguous ids") {
    val o = MultiModalSynth.objects(spark, ds).collect()
    assert(o.length == 200)
    assert(o.map(_.id).sorted.toSeq == (0L until 200L))
  }

  test("objects: m modality vectors of the right dimension, all unit-norm") {
    val o = MultiModalSynth.objects(spark, ds).collect()
    o.foreach { r =>
      assert(r.vecs.length == ds.m)
      r.vecs.foreach { v =>
        assert(v.length == ds.dim)
        assert(math.abs(VecOps.norm(v.toArray) - 1.0) < 1e-9)
      }
    }
  }

  test("objects are deterministic across invocations") {
    val a = MultiModalSynth.objects(spark, ds).collect().sortBy(_.id)
    val b = MultiModalSynth.objects(spark, ds).collect().sortBy(_.id)
    assert(a.map(_.vecs).toSeq == b.map(_.vecs).toSeq)
  }

  test("different dataset seeds give different objects") {
    val a = MultiModalSynth.objects(spark, ds).collect().sortBy(_.id)
    val b = MultiModalSynth.objects(spark, ds.copy(seed = 12L)).collect().sortBy(_.id)
    assert(a.map(_.vecs).toSeq != b.map(_.vecs).toSeq)
  }

  test("cluster assignment is stable and within range") {
    (0L until 50L).foreach { id =>
      val g = MultiModalSynth.clusterOf(ds, id)
      assert(g >= 0 && g < ds.nClusters)
      assert(g == MultiModalSynth.clusterOf(ds, id))
    }
  }

  test("same-cluster objects are more similar than cross-cluster on average") {
    val objs = MultiModalSynth.objects(spark, ds).collect().sortBy(_.id)
    val byCluster = objs.groupBy(o => MultiModalSynth.clusterOf(ds, o.id))
    val sameIps = byCluster.values.filter(_.length >= 2).flatMap { g =>
      g.combinations(2).map(p => VecOps.dot(p(0).vecs(0).toArray, p(1).vecs(0).toArray))
    }.toSeq
    val crossIps = (for {
      i <- 0 until 60; j <- (i + 1) until 60
      if MultiModalSynth.clusterOf(ds, i.toLong) != MultiModalSynth.clusterOf(ds, j.toLong)
    } yield VecOps.dot(objs(i).vecs(0).toArray, objs(j).vecs(0).toArray))
    assert(sameIps.nonEmpty && crossIps.nonEmpty)
    assert(sameIps.sum / sameIps.size > crossIps.sum / crossIps.size + 0.2,
      s"same=${sameIps.sum / sameIps.size} cross=${crossIps.sum / crossIps.size}")
  }

  test("queries: gt ids are valid and deterministic") {
    val q = MultiModalSynth.queries(spark, ds, enc).collect().sortBy(_.qid)
    assert(q.length == ds.nQueries)
    q.foreach(r => assert(r.gt >= 0 && r.gt < ds.n))
    val q2 = MultiModalSynth.queries(spark, ds, enc).collect().sortBy(_.qid)
    assert(q.map(_.vecs).toSeq == q2.map(_.vecs).toSeq)
  }

  test("queries: unit-norm vectors in every active slot") {
    MultiModalSynth.queries(spark, ds, enc).collect().foreach { q =>
      q.vecs.foreach(v => assert(math.abs(VecOps.norm(v.toArray) - 1.0) < 1e-9))
    }
  }

  test("queries point at their ground truth: IP(q_i, gt_i) beats random objects") {
    val objs = MultiModalSynth.objects(spark, ds).collect().sortBy(_.id)
    val qs = MultiModalSynth.queries(spark, ds, enc).collect()
    val gtIp = qs.map(q => VecOps.dot(q.vecs(0).toArray, objs(q.gt.toInt).vecs(0).toArray))
    val rndIp = qs.map(q => VecOps.dot(q.vecs(0).toArray, objs(((q.gt + 97) % ds.n).toInt).vecs(0).toArray))
    assert(gtIp.sum / gtIp.length > rndIp.sum / rndIp.length + 0.15)
  }

  test("lower encoder noise yields higher query-gt similarity") {
    val objs = MultiModalSynth.objects(spark, ds).collect().sortBy(_.id)
    def meanGtIp(e: EncoderConfig): Double = {
      val qs = MultiModalSynth.queries(spark, ds, e).collect()
      qs.map(q => VecOps.dot(q.vecs(0).toArray, objs(q.gt.toInt).vecs(0).toArray)).sum / qs.length
    }
    val good = meanGtIp(enc.copy(targetNoise = 0.3))
    val bad = meanGtIp(enc.copy(targetNoise = 1.2))
    assert(good > bad + 0.1, s"good=$good bad=$bad")
  }

  test("no composition head: comp is empty; composition head: comp is unit-norm") {
    MultiModalSynth.queries(spark, ds, enc).collect().foreach(q => assert(q.comp.isEmpty))
    MultiModalSynth.queries(spark, ds, compEnc).collect().foreach { q =>
      assert(q.comp.nonEmpty)
      assert(math.abs(VecOps.norm(q.comp.toArray) - 1.0) < 1e-9)
    }
  }

  test("composition-target encoders place the composition vector in slot 0") {
    MultiModalSynth.queries(spark, ds, compEnc).collect().foreach { q =>
      assert(q.vecs(0) == q.comp)
    }
  }

  test("modality mask empties the masked slots") {
    val q = MultiModalSynth.queries(spark, ds, enc, mask = Seq(true, false)).collect()
    q.foreach { r =>
      assert(r.vecs(0).nonEmpty)
      assert(r.vecs(1).isEmpty)
    }
  }

  test("mask of wrong length is rejected") {
    intercept[IllegalArgumentException](
      MultiModalSynth.queries(spark, ds, enc, mask = Seq(true)).collect())
  }

  test("train and eval seed tags give different queries over the same gts universe") {
    val evalQ = MultiModalSynth.queries(spark, ds, enc, seedTag = 0L).collect().sortBy(_.qid)
    val trainQ = MultiModalSynth.queries(spark, ds, enc, seedTag = 1L).collect().sortBy(_.qid)
    assert(evalQ.map(_.vecs).toSeq != trainQ.map(_.vecs).toSeq)
  }

  test("nQueries override controls the batch size") {
    assert(MultiModalSynth.queries(spark, ds, enc, nQueries = 7).count() == 7)
  }

  test("encoder config validation: composition target requires a head") {
    intercept[IllegalArgumentException](
      EncoderConfig("bad", 0.5, Seq(0.5), targetIsComposition = true))
  }

  test("aux modality noise is applied per modality independently") {
    val e3 = EncoderConfig("e3", targetNoise = 0.6, auxNoises = Seq(0.2, 1.4))
    val ds3 = ds.copy(m = 3, name = "test3")
    val objs = MultiModalSynth.objects(spark, ds3).collect().sortBy(_.id)
    val qs = MultiModalSynth.queries(spark, ds3, e3).collect()
    def gtIp(mod: Int): Double =
      qs.map(q => VecOps.dot(q.vecs(mod).toArray, objs(q.gt.toInt).vecs(mod).toArray)).sum / qs.length
    assert(gtIp(1) > gtIp(2) + 0.1, s"aux1=${gtIp(1)} aux2=${gtIp(2)}")
  }
}
