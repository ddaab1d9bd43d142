package repro.mmdata

import org.apache.spark.sql.{Dataset, SparkSession}
import repro.core.Types._
import repro.core.VecOps

/** Synthetic multimodal embedding substrate (substitute for the paper's
  * real datasets + pretrained encoders; see DESIGN.md §1).
  *
  * Generative model. Each object `o` has a latent feature z_o = c_{g(o)} +
  * tau * xi_o in R^dLat, where c are `nClusters` Gaussian cluster centers
  * (clusters play the role of MIT-States noun/state groups, CelebA
  * identities, Shopping categories — they create *hard* rivals whose
  * vectors are close to the ground truth). Modality `i` of object `o` is
  *
  *   φᵢ(oⁱ) = normalize(Aᵢ z_o + objNoise · η)
  *
  * with a per-modality random projection Aᵢ ∈ R^{dim×dLat}. A query whose
  * ground-truth object is `a` draws each modality as
  *
  *   φᵢ(qⁱ) = normalize(Aᵢ z_a + σᵢ · η'),  σᵢ = encoder noise (query side)
  *
  * and, when the simulated encoder has a multimodal head (TIRG/CLIP/MPC),
  * a composition vector Φ(q⁰..qᵗ⁻¹) = normalize(A₀ z_a + σ_comp · η'') in
  * the modality-0 space. Noise draws are independent across modalities, so
  * fusing modalities genuinely averages error down — the mechanism all of
  * the paper's accuracy tables measure.
  *
  * Everything is a pure function of (config, ids): executors regenerate
  * identical vectors with counter-based RNG ([[VecOps.mix64]]), no state
  * is shipped, and the generator is deterministic across runs.
  */
object MultiModalSynth {

  // Tag namespaces for the counter-based RNG (must be mutually distinct).
  private val TagProj = 101L
  private val TagCenter = 202L
  private val TagXi = 303L
  private val TagObjNoise = 404L
  private val TagQueryNoise = 505L
  private val TagCompNoise = 606L
  private val TagGtPick = 707L

  /** Object-side encoding noise: a dataset-level constant (DESIGN.md §1 —
    * encoder quality differences are folded into query-side noise so that
    * object embeddings, and therefore the per-modality baseline indexes,
    * are shared across encoder rows of one table).
    */
  val ObjNoise = 0.15

  /** Per-modality projection Aᵢ, entries N(0, 1/√dLat) so ‖Aᵢz‖ ≈ ‖z‖. */
  def projection(ds: DatasetConfig, modality: Int): Array[Array[Double]] = {
    val s = 1.0 / math.sqrt(ds.dLat.toDouble)
    Array.tabulate(ds.dim) { r =>
      VecOps.gaussianVec(ds.seed, TagProj * 1000 + modality, r.toLong, ds.dLat).map(_ * s)
    }
  }

  def clusterCenter(ds: DatasetConfig, g: Int): Array[Double] =
    VecOps.gaussianVec(ds.seed, TagCenter, g.toLong, ds.dLat)

  /** Cluster assignment of object `id`. */
  def clusterOf(ds: DatasetConfig, id: Long): Int =
    math.floorMod(VecOps.mix64(ds.seed ^ VecOps.mix64(id + 0x777L)), ds.nClusters.toLong).toInt

  /** Latent feature z_o = c_{g(o)} + tau·xi_o. */
  def latent(ds: DatasetConfig, id: Long): Array[Double] = {
    val c = clusterCenter(ds, clusterOf(ds, id))
    val xi = VecOps.gaussianVec(ds.seed, TagXi, id, ds.dLat)
    VecOps.axpy(c, ds.tau, xi)
  }

  private def project(a: Array[Array[Double]], z: Array[Double]): Array[Double] =
    a.map(row => VecOps.dot(row, z))

  /** φᵢ(oⁱ): normalized noisy projection of the latent. */
  def objectVec(ds: DatasetConfig, id: Long, modality: Int,
                proj: Array[Array[Double]]): Array[Double] = {
    val clean = project(proj, latent(ds, id))
    val eta = VecOps.gaussianVec(ds.seed, TagObjNoise * 100 + modality, id, ds.dim)
    VecOps.normalize(VecOps.axpy(clean, ObjNoise, eta))
  }

  /** Ground-truth object id for query `qid` (uniform over the object set). */
  def gtOf(ds: DatasetConfig, qid: Long, seedTag: Long): Long =
    math.floorMod(VecOps.mix64(ds.seed ^ VecOps.mix64(TagGtPick + seedTag) ^ VecOps.mix64(qid)), ds.n)

  /** Object set S as a Dataset — `vecs(i)` = φᵢ(oⁱ). */
  def objects(spark: SparkSession, ds: DatasetConfig): Dataset[MMObject] = {
    import spark.implicits._
    val dsConf = ds
    spark.range(ds.n).mapPartitions { it =>
      val projs = Array.tabulate(dsConf.m)(i => projection(dsConf, i))
      it.map { idL =>
        val id: Long = idL
        MMObject(id, Array.tabulate(dsConf.m)(i => objectVec(dsConf, id, i, projs(i)).toSeq).toSeq)
      }
    }
  }

  /** Query set for one encoder row.
    *
    * @param enc      simulated encoder combination
    * @param mask     active query modalities (length m); masked-out slots
    *                 are empty arrays (t < m case, Table X / XIX / XX)
    * @param seedTag  namespace separating eval queries from weight-learning
    *                 training anchors (0 = eval, 1 = train)
    */
  def queries(spark: SparkSession, ds: DatasetConfig, enc: EncoderConfig,
              mask: Seq[Boolean] = Nil, seedTag: Long = 0L,
              nQueries: Int = -1): Dataset[MMQuery] = {
    import spark.implicits._
    val m = if (mask.isEmpty) Seq.fill(ds.m)(true) else mask
    require(m.length == ds.m, s"mask length ${m.length} != m ${ds.m}")
    val dsConf = ds
    val nq = if (nQueries > 0) nQueries else ds.nQueries
    spark.range(nq.toLong).mapPartitions { it =>
      val projs = Array.tabulate(dsConf.m)(i => projection(dsConf, i))
      it.map { qidL =>
        val qid: Long = qidL
        mkQuery(dsConf, enc, m, seedTag, qid, projs)
      }
    }
  }

  /** Builds one query row (exposed for driver-side unit tests). */
  def mkQuery(ds: DatasetConfig, enc: EncoderConfig, mask: Seq[Boolean],
              seedTag: Long, qid: Long, projs: Array[Array[Array[Double]]]): MMQuery = {
    val gt = gtOf(ds, qid, seedTag)
    val z = latent(ds, gt)
    val comp: Seq[Double] =
      if (enc.hasComposition) {
        val eta = VecOps.gaussianVec(ds.seed, TagCompNoise + seedTag * 17, qid, ds.dim)
        VecOps.normalize(VecOps.axpy(project(projs(0), z), enc.compNoise, eta)).toSeq
      } else Seq.empty
    val vecs: Seq[Seq[Double]] = Array.tabulate(ds.m) { i =>
      if (!mask(i)) Seq.empty[Double]
      else if (i == 0 && enc.targetIsComposition) comp
      else {
        val eta = VecOps.gaussianVec(ds.seed, TagQueryNoise * 100 + i + seedTag * 17, qid, ds.dim)
        VecOps.normalize(VecOps.axpy(project(projs(i), z), enc.noiseFor(i), eta)).toSeq
      }
    }.toSeq
    MMQuery(qid, gt, vecs, comp)
  }
}
