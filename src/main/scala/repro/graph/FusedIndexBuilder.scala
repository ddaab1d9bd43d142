package repro.graph

import org.apache.spark.sql.{Dataset, SparkSession}
import repro.core.{JointSimilarity, VecOps}
import repro.core.Types.IndexConfig

/** The fused proximity-graph index (paper §VII-A, Algorithm 1).
  *
  * @param adjacency  out-neighbors per vertex (vertex id = object id)
  * @param seedVertex fixed entry point (component ④: nearest to centroid)
  * @param weights    modality weights w = ω² the graph was built under
  */
final case class FusedIndex(
    adjacency: Array[Array[Int]],
    seedVertex: Int,
    weights: Array[Double],
) extends Serializable {
  def n: Int = adjacency.length
  def degree(v: Int): Int = adjacency(v).length
  def maxDegree: Int = if (adjacency.isEmpty) 0 else adjacency.iterator.map(_.length).max
}

/** Component-based index construction pipeline (Algorithm 1, components
  * ①–⑤), expressed as a distributed DataFrame job:
  *
  *  - ① Initialization: random γ-NN lists refined by ε rounds of
  *    NNDescent. Each round is a self-join of the neighbor DataFrame
  *    (neighbors-of-neighbors), scored in mapPartitions against the
  *    broadcast [[VectorStore]], then reduced to the best γ per vertex
  *    with `groupByKey`. (The paper's one-at-a-time replacement loop and
  *    this batch top-γ update reach the same fixpoint; batching is the
  *    dataflow-friendly formulation.)
  *  - ② Candidate acquisition: one more neighbors-of-neighbors expansion,
  *    keeping each vertex's best candidates.
  *  - ③ Neighbor selection: MRNG pruning (Lemma 2) per vertex, executed in
  *    mapPartitions; toggling `useMrngSelection` off yields the
  *    KGraph-style top-γ graph used in the §VIII-G pipeline ablation.
  *  - ④ Seed preprocessing: seed = argmax joint IP to the centroid of the
  *    concatenated vectors.
  *  - ⑤ Connectivity: BFS from the seed over the (small, γ-regular)
  *    collected adjacency; unreached vertices get a bridge edge from
  *    their nearest visited vertex.
  */
object FusedIndexBuilder {

  // Row types for the build dataflow. Public: Spark's codegen needs to
  // instantiate them from generated projection classes.
  final case class Nbrs(id: Int, nbrs: Array[Int])
  final case class Cand(id: Int, u: Int)
  final case class Scored(id: Int, u: Int, ip: Double)
  final case class CandList(id: Int, us: Array[Int], ips: Array[Double])

  /** Max candidates kept per vertex in component ② (paper keeps N(o) ∪
    * N(N(o)) in full; capping at γ·(γ+1) only drops duplicates' tail). */
  private def candCap(gamma: Int): Int = gamma * (gamma + 1)

  /** Component ① alone: the NNDescent kNN graph after ε refinement rounds
    * (random init at ε = 0). This is the graph whose quality App. H /
    * Table XI measures against the exact top-γ lists. */
  def nnDescentGraph(
      spark: SparkSession,
      store: VectorStore,
      weights: Array[Double],
      gamma: Int,
      epsilon: Int,
      seed: Long = 1234L,
  ): Array[Array[Int]] = {
    import spark.implicits._
    val bStore = spark.sparkContext.broadcast(store)
    val bw = spark.sparkContext.broadcast(weights)
    var nbrs = initRandom(spark, store.n, math.min(gamma, store.n - 1), seed)
    nbrs.cache(); nbrs.count()
    for (_ <- 0 until epsilon) {
      val refined = expandAndSelect(spark, nbrs, bStore, bw, keep = gamma)
        .map(c => Nbrs(c.id, c.us)).cache()
      refined.count(); nbrs.unpersist(); nbrs = refined
    }
    val out = new Array[Array[Int]](store.n)
    nbrs.collect().foreach(r => out(r.id) = r.nbrs)
    nbrs.unpersist(); bStore.destroy(); bw.destroy()
    out
  }

  private def initRandom(spark: SparkSession, n: Int, gamma: Int, seed: Long): Dataset[Nbrs] = {
    import spark.implicits._
    spark.range(n.toLong).map { idL =>
      val idLong: Long = idL
      val id = idLong.toInt
      val picked = new scala.collection.mutable.LinkedHashSet[Int]
      var c = 0L
      while (picked.size < gamma) {
        val cand = math.floorMod(VecOps.mix64(seed ^ VecOps.mix64(idLong * 31 + c)), n.toLong).toInt
        if (cand != id) picked += cand
        c += 1
      }
      Nbrs(id, picked.toArray)
    }
  }

  def build(
      spark: SparkSession,
      store: VectorStore,
      weights: Array[Double],
      cfg: IndexConfig = IndexConfig(),
      seed: Long = 1234L,
  ): FusedIndex = {
    import spark.implicits._
    val n = store.n
    require(n > 1, "index needs at least two objects")
    val gamma = math.min(cfg.gamma, n - 1)
    val bStore = spark.sparkContext.broadcast(store)
    val bw = spark.sparkContext.broadcast(weights)

    def jointIp(a: Int, b: Int): Double =
      JointSimilarity.jointIP(bw.value, bStore.value.vecs(a), bStore.value.vecs(b))

    // ① random initialization
    var nbrs: Dataset[Nbrs] = initRandom(spark, n, gamma, seed).cache()
    nbrs.count()

    // ① NNDescent refinement: ε rounds of neighbors-of-neighbors top-γ.
    for (_ <- 0 until cfg.epsilon) {
      val refined = expandAndSelect(spark, nbrs, bStore, bw, keep = gamma)
        .map(c => Nbrs(c.id, c.us))
        .cache()
      refined.count()
      nbrs.unpersist()
      nbrs = refined
    }

    // ② candidate acquisition + ③ neighbor selection
    val cands = expandAndSelect(spark, nbrs, bStore, bw, keep = candCap(gamma))
    val selected: Dataset[Nbrs] =
      if (cfg.useMrngSelection)
        cands.mapPartitions { it =>
          it.map { c =>
            Nbrs(c.id, mrngSelect(c.id, c.us, c.ips, gamma, bStore.value, bw.value))
          }
        }
      else cands.map(c => Nbrs(c.id, c.us.take(gamma)))

    val adjacency = new Array[Array[Int]](n)
    selected.collect().foreach(r => adjacency(r.id) = r.nbrs)
    require(!adjacency.contains(null), "selection lost a vertex")
    nbrs.unpersist()

    // ④ seed = vertex nearest to the centroid of concatenated vectors.
    // (Per-modality mean ⇔ concatenated-vector mean, by linearity.)
    val m = store.m
    val centroid = Array.tabulate(m) { i =>
      val acc = new Array[Double](store.vecs(0)(i).length)
      var v = 0
      while (v < n) { val vec = store.vecs(v)(i); var j = 0; while (j < vec.length) { acc(j) += vec(j); j += 1 }; v += 1 }
      acc.map(_ / n)
    }
    var seedVertex = 0
    var bestIp = Double.NegativeInfinity
    var v = 0
    while (v < n) {
      val ip = JointSimilarity.jointIP(weights, centroid, store.vecs(v))
      if (ip > bestIp) { bestIp = ip; seedVertex = v }
      v += 1
    }

    // ⑤ connectivity repair by BFS from the seed.
    if (cfg.ensureConnectivity) repairConnectivity(adjacency, seedVertex, jointIp)

    bStore.destroy(); bw.destroy()
    FusedIndex(adjacency, seedVertex, weights.clone())
  }

  /** Neighbors-of-neighbors expansion scored against the broadcast store,
    * reduced to each vertex's best `keep` candidates (desc by joint IP).
    * Shared by the NNDescent rounds (keep = γ) and component ② (keep =
    * candidate cap). Current neighbors always remain candidates.
    */
  private def expandAndSelect(
      spark: SparkSession,
      nbrs: Dataset[Nbrs],
      bStore: org.apache.spark.broadcast.Broadcast[VectorStore],
      bw: org.apache.spark.broadcast.Broadcast[Array[Double]],
      keep: Int,
  ): Dataset[CandList] = {
    import spark.implicits._
    val edges = nbrs.flatMap(r => r.nbrs.map(u => Cand(r.id, u)))
    val byV = nbrs.map(r => (r.id, r.nbrs)).toDF("v", "vn")
    val twoHop = edges.toDF("id", "v")
      .join(byV, "v")
      .select($"id", org.apache.spark.sql.functions.explode($"vn").as("u"))
      .where($"u" =!= $"id")
      .as[Cand]
    val all = twoHop.union(edges).dropDuplicates("id", "u")
    all
      .mapPartitions { it =>
        val st = bStore.value; val w = bw.value
        it.map(c => Scored(c.id, c.u, JointSimilarity.jointIP(w, st.vecs(c.id), st.vecs(c.u))))
      }
      .groupByKey(_.id)
      .mapGroups { (id, it) =>
        val top = it.toArray.sortBy(s => (-s.ip, s.u)).take(keep)
        CandList(id, top.map(_.u), top.map(_.ip))
      }
  }

  /** MRNG selection (Algorithm 1 lines 11–17): walk candidates in
    * descending joint IP; accept v iff it is closer to o than to every
    * already-accepted neighbor (Lemma 2 diversification). */
  def mrngSelect(
      o: Int,
      us: Array[Int],
      ips: Array[Double],
      gamma: Int,
      store: VectorStore,
      w: Array[Double],
  ): Array[Int] = {
    val out = new scala.collection.mutable.ArrayBuffer[Int](gamma)
    var i = 0
    while (i < us.length && out.length < gamma) {
      val v = us(i)
      if (v != o) {
        var ok = true
        var j = 0
        while (ok && j < out.length) {
          val u = out(j)
          if (JointSimilarity.jointIP(w, store.vecs(u), store.vecs(v)) >= ips(i)) ok = false
          j += 1
        }
        if (ok) out += v
      }
      i += 1
    }
    out.toArray
  }

  /** Component ⑤: BFS from the seed; for every unreached vertex add a
    * bridge edge from its nearest visited vertex (sampled when the
    * frontier is large) and continue the BFS through it. */
  private def repairConnectivity(
      adjacency: Array[Array[Int]],
      seedVertex: Int,
      jointIp: (Int, Int) => Double,
  ): Unit = {
    val n = adjacency.length
    val visited = new Array[Boolean](n)
    val queue = new java.util.ArrayDeque[Int]()
    def bfsFrom(s: Int): Unit = {
      if (!visited(s)) { visited(s) = true; queue.add(s) }
      while (!queue.isEmpty) {
        val v = queue.poll()
        adjacency(v).foreach { u => if (!visited(u)) { visited(u) = true; queue.add(u) } }
      }
    }
    bfsFrom(seedVertex)
    var u = 0
    while (u < n) {
      if (!visited(u)) {
        // nearest visited vertex, over a capped deterministic sample
        val visitedIds = (0 until n).filter(visited)
        val sample =
          if (visitedIds.length <= 1024) visitedIds
          else visitedIds.grouped(math.max(1, visitedIds.length / 1024)).map(_.head).toIndexedSeq
        val bridge = sample.maxBy(v => jointIp(v, u))
        adjacency(bridge) = adjacency(bridge) :+ u
        bfsFrom(u)
      }
      u += 1
    }
  }
}
