package repro.baseline

import org.apache.spark.sql.Dataset
import repro.core.Types._
import repro.graph.{FusedIndex, JointSearch, VectorStore}

/** Baseline 2: Joint Embedding (paper §III, Fig. 2 upper-right).
  *
  * The multimodal query is fused into a single composition vector
  * Φ(q⁰..qᵗ⁻¹) (the simulated TIRG/CLIP/MPC head of
  * [[repro.mmdata.MultiModalSynth]]) and searched against the index built
  * on the target-modality vectors {φ₀(o⁰)} alone — i.e. the modality-0
  * one-hot index shared with MR.
  */
object JointEmbeddingSearch {

  /** Single-channel search of the composition vector on the target index. */
  def search(
      queries: Dataset[MMQuery],
      targetIndex: FusedIndex,
      store: VectorStore,
      m: Int,
      cfg: SearchConfig,
  ): Dataset[JointSearch.SearchResult] = {
    val spark = queries.sparkSession
    import spark.implicits._
    val compQueries = queries.map { q =>
      require(q.comp.nonEmpty, s"query ${q.qid} has no composition vector — JE needs a multimodal head")
      q.copy(vecs = q.comp +: Seq.fill(m - 1)(Seq.empty[Double]))
    }
    JointSearch.search(compQueries, targetIndex, store, MultiStreamRetrieval.oneHot(m, 0), cfg)
  }
}
