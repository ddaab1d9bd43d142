package repro.graph

import org.apache.spark.sql.Dataset
import repro.core.{JointSimilarity, VecOps}
import repro.core.Types._

/** Merging-free joint search on the fused index (paper §VII-B, Algorithm 2)
  * plus the multi-vector computation optimization (Eq. 8/9, Lemma 4).
  *
  * Queries are a DataFrame; the compact index and vector store are
  * broadcast and each partition runs the greedy routing kernel per query —
  * the "index-pruned scan" formulation of the search: instead of scanning
  * all n objects, each query touches only the vertices the graph routes it
  * through.
  */
object JointSearch {

  /** Per-query output. `results` is the approximate top-k (desc joint IP).
    *
    * @param dotProducts   modality-level dot products actually computed
    * @param prunedObjects objects discarded early by the Lemma-4 bound
    * @param hops          greedy iterations (vertices expanded)
    */
  final case class SearchResult(
      qid: Long,
      gt: Long,
      results: Seq[Long],
      dotProducts: Long,
      prunedObjects: Long,
      hops: Long,
  )

  /** Greedy routing kernel (Algorithm 2). Pure function; runs inside
    * mapPartitions for the Dataset API and on the driver for unit tests.
    *
    * R is the fixed-size (l) result set ordered by joint IP; H marks
    * expanded vertices. A `scored` set avoids recomputing IPs for vertices
    * already evaluated (the paper's H-check plus memoization — identical
    * result set, fewer dot products).
    *
    * @return (top-k ids, dot products, pruned count, hops, per-iteration
    *         sum of R's IPs — the monotone f(η) of Lemma 3)
    */
  def searchKernel(
      qVecs: Array[Array[Double]],
      qid: Long,
      w: Array[Double],
      index: FusedIndex,
      store: VectorStore,
      cfg: SearchConfig,
      seed: Long = 99L,
  ): (Array[Int], Long, Long, Long, Array[Double]) = {
    val n = index.n
    val l = math.min(cfg.l, n)
    var dots = 0L
    var prunedCnt = 0L

    def exactIp(v: Int): Double = {
      val r = JointSimilarity.partialJointIP(w, qVecs, store.vecs(v), Double.NegativeInfinity)
      dots += r.modalitiesScanned
      r.ip
    }

    // R ordered worst-last; ties broken by id for determinism.
    implicit val ord: Ordering[(Double, Int)] =
      Ordering.Tuple2(Ordering[Double].reverse, Ordering[Int])
    val r = scala.collection.mutable.TreeSet.empty[(Double, Int)]
    val inR = new java.util.HashMap[Integer, java.lang.Double]()
    val scored = new java.util.HashSet[Integer]()
    val expanded = new java.util.HashSet[Integer]()

    def add(v: Int): Unit = {
      if (!inR.containsKey(v)) {
        val ip = exactIp(v)
        r.add((ip, v)); inR.put(v, ip); scored.add(v)
      }
    }
    // Line 1–3: seed + (l−1) random vertices, scored exactly.
    add(index.seedVertex)
    var c = 0L
    while (inR.size < l) {
      val cand = math.floorMod(VecOps.mix64(seed ^ VecOps.mix64(qid * 131 + c)), n.toLong).toInt
      add(cand)
      c += 1
    }

    var hops = 0L
    val fEta = scala.collection.mutable.ArrayBuffer[Double](r.iterator.map(_._1).sum)
    var done = false
    while (!done) {
      // Line 5: unvisited vertex in R nearest to q.
      val next = r.iterator.find(p => !expanded.contains(p._2))
      next match {
        case None => done = true
        case Some((_, v)) =>
          expanded.add(v); hops += 1
          val nbrs = index.adjacency(v)
          var i = 0
          while (i < nbrs.length) {
            val u = nbrs(i)
            if (!scored.contains(u) && !inR.containsKey(u)) {
              val worst = r.last // line 8: z = argmin IP in R
              if (cfg.usePartialDistance) {
                val pr = JointSimilarity.partialJointIP(w, qVecs, store.vecs(u), worst._1)
                dots += pr.modalitiesScanned
                scored.add(u)
                if (pr.pruned) prunedCnt += 1
                else if (pr.ip > worst._1) {
                  r.remove(worst); inR.remove(worst._2)
                  r.add((pr.ip, u)); inR.put(u, pr.ip)
                }
              } else {
                val ip = exactIp(u)
                scored.add(u)
                if (ip > worst._1) {
                  r.remove(worst); inR.remove(worst._2)
                  r.add((ip, u)); inR.put(u, ip)
                }
              }
            }
            i += 1
          }
          fEta += r.iterator.map(_._1).sum
      }
    }
    (r.iterator.take(cfg.k).map(_._2).toArray, dots, prunedCnt, hops, fEta.toArray)
  }

  /** Distributed search: queries as a Dataset, index + store broadcast. */
  def search(
      queries: Dataset[MMQuery],
      index: FusedIndex,
      store: VectorStore,
      w: Array[Double],
      cfg: SearchConfig = SearchConfig(),
  ): Dataset[SearchResult] = {
    val spark = queries.sparkSession
    import spark.implicits._
    val bIdx = spark.sparkContext.broadcast(index)
    val bStore = spark.sparkContext.broadcast(store)
    val bw = spark.sparkContext.broadcast(w)
    queries.mapPartitions { it =>
      val idx = bIdx.value; val st = bStore.value; val ww = bw.value
      it.map { q =>
        val qv = q.vecs.map(_.toArray).toArray
        val (ids, dots, pruned, hops, _) = searchKernel(qv, q.qid, ww, idx, st, cfg)
        SearchResult(q.qid, q.gt, ids.map(_.toLong).toSeq, dots, pruned, hops)
      }
    }
  }
}
