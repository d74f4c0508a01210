package repro.data

import repro.uncertain.UncertainGraph
import scala.collection.mutable
import scala.util.Random

/** The evaluation datasets of §VI-A (Table II), at laptop scale.
  *
  * Karate Club is public and tiny: its **real topology and ground-truth
  * communities** are hardcoded. The other datasets are proprietary to
  * download or far beyond this container, so each is replaced by a
  * synthetic stand-in matching its *degree structure* (power-law /
  * near-complete) and its *edge-probability model* as reported in Table II
  * (exponential-cdf of communication counts, reciprocal-degree, Beta-like
  * confidences). See DESIGN.md §4 for the substitution rationale.
  */
object Datasets {

  // ---------------------------------------------------------------- Karate

  /** Zachary's karate club [82]: 34 nodes, 78 edges (0-indexed). */
  val karateEdges: Seq[(Int, Int)] = Seq(
    (1, 2), (1, 3), (1, 4), (1, 5), (1, 6), (1, 7), (1, 8), (1, 9), (1, 11), (1, 12),
    (1, 13), (1, 14), (1, 18), (1, 20), (1, 22), (1, 32),
    (2, 3), (2, 4), (2, 8), (2, 14), (2, 18), (2, 20), (2, 22), (2, 31),
    (3, 4), (3, 8), (3, 9), (3, 10), (3, 14), (3, 28), (3, 29), (3, 33),
    (4, 8), (4, 13), (4, 14),
    (5, 7), (5, 11),
    (6, 7), (6, 11), (6, 17),
    (7, 17),
    (9, 31), (9, 33), (9, 34),
    (10, 34),
    (14, 34),
    (15, 33), (15, 34),
    (16, 33), (16, 34),
    (19, 33), (19, 34),
    (20, 34),
    (21, 33), (21, 34),
    (23, 33), (23, 34),
    (24, 26), (24, 28), (24, 30), (24, 33), (24, 34),
    (25, 26), (25, 28), (25, 32),
    (26, 32),
    (27, 30), (27, 34),
    (28, 34),
    (29, 32), (29, 34),
    (30, 33), (30, 34),
    (31, 33), (31, 34),
    (32, 33), (32, 34),
    (33, 34),
  ).map { case (u, v) => (u - 1, v - 1) }

  /** Ground-truth factions [82]: 0 = Mr. Hi, 1 = Officer. */
  val karateCommunities: Array[Int] = {
    val mrHi = Set(1, 2, 3, 4, 5, 6, 7, 8, 11, 12, 13, 14, 17, 18, 20, 22).map(_ - 1)
    Array.tabulate(34)(v => if (mrHi.contains(v)) 0 else 1)
  }

  /** Karate Club uncertain graph: p(e) = 1 − exp(−t/μ), μ = 20 [89], with
    * synthetic communication counts t that grow with the endpoints' shared
    * ties (Zachary's real interaction weights concentrate on the factions'
    * dense cores), calibrated to Table II's stats (mean ≈ .25).
    */
  def karate(seed: Long = 42L): UncertainGraph = {
    val rnd = new Random(seed)
    val det = repro.graph.Graph.fromEdges(34, karateEdges)
    val edges = karateEdges.map { case (u, v) =>
      val cn = det.adj(u).count(w => det.hasEdge(v, w))
      val t = 1 + 2 * cn + rnd.nextInt(3)
      (u, v, 1.0 - math.exp(-t / 20.0))
    }
    UncertainGraph.fromEdges(34, edges)
  }

  // --------------------------------------------------------- random models

  /** Erdős–Rényi G(n, p) topology with uniform edge probabilities (§VI-H). */
  def er(n: Int, pEdge: Double, seed: Long): UncertainGraph = {
    val rnd = new Random(seed)
    val edges = for {
      u <- 0 until n; v <- u + 1 until n
      if rnd.nextDouble() < pEdge
    } yield (u, v, 0.05 + rnd.nextDouble() * 0.9)
    UncertainGraph.fromEdges(n, edges)
  }

  /** Barabási–Albert preferential attachment with `attach` edges per new
    * node and uniform edge probabilities (§VI-H).
    */
  def ba(n: Int, attach: Int, seed: Long): UncertainGraph = {
    val rnd = new Random(seed)
    val edges = baTopology(n, attach, rnd).map { case (u, v) =>
      (u, v, 0.05 + rnd.nextDouble() * 0.9)
    }
    UncertainGraph.fromEdges(n, edges)
  }

  private def baTopology(n: Int, attach: Int, rnd: Random): Seq[(Int, Int)] = {
    val m0 = math.max(2, attach)
    val edges = mutable.ArrayBuffer.empty[(Int, Int)]
    val endpoints = mutable.ArrayBuffer.empty[Int] // degree-proportional urn
    for (u <- 0 until m0; v <- u + 1 until m0) {
      edges += ((u, v)); endpoints += u; endpoints += v
    }
    for (v <- m0 until n) {
      val targets = mutable.HashSet.empty[Int]
      var guard = 0
      while (targets.size < math.min(attach, v) && guard < 100 * attach) {
        targets += endpoints(rnd.nextInt(endpoints.length))
        guard += 1
      }
      for (u <- targets) { edges += ((u, v)); endpoints += u; endpoints += v }
    }
    edges.toSeq
  }

  /** Holme–Kim topology: preferential attachment with triad formation —
    * after each preferential link, with probability `pTriad` the next link
    * closes a triangle with a neighbour of the previous target. Gives the
    * clustering a BA graph lacks (social-network stand-ins).
    */
  private def hkTopology(n: Int, attach: Int, pTriad: Double, rnd: Random): Seq[(Int, Int)] = {
    val m0 = math.max(2, attach)
    val edges = mutable.ArrayBuffer.empty[(Int, Int)]
    val adj = Array.fill(n)(mutable.ArrayBuffer.empty[Int])
    val endpoints = mutable.ArrayBuffer.empty[Int]
    def addEdge(u: Int, v: Int): Unit = {
      edges += ((u, v)); adj(u) += v; adj(v) += u; endpoints += u; endpoints += v
    }
    for (u <- 0 until m0; v <- u + 1 until m0) addEdge(u, v)
    for (v <- m0 until n) {
      val targets = mutable.HashSet.empty[Int]
      var last = -1
      var guard = 0
      while (targets.size < math.min(attach, v) && guard < 100 * attach) {
        guard += 1
        val cand =
          if (last >= 0 && rnd.nextDouble() < pTriad && adj(last).nonEmpty)
            adj(last)(rnd.nextInt(adj(last).length))
          else endpoints(rnd.nextInt(endpoints.length))
        if (cand != v && !targets.contains(cand)) { targets += cand; last = cand }
      }
      for (u <- targets) addEdge(u, v)
    }
    edges.toSeq
  }

  private def clamp(x: Double): Double = math.min(0.99, math.max(0.01, x))

  /** Plant dense high-probability communities: disjoint node groups fully
    * connected with elevated edge probabilities. Real Biomine/Twitter-scale
    * graphs contain such clusters (protein complexes, co-retweet groups) —
    * they are what gives the paper's NDS a stable nucleus with expected
    * density close to the EDS optimum (Table III). Planted edges are
    * emitted first so they win deduplication against the background
    * topology.
    */
  private def planted(rnd: Random, groups: Seq[(Seq[Int], Double)]): Seq[(Int, Int, Double)] =
    for {
      (nodes, meanP) <- groups
      i <- nodes.indices
      j <- i + 1 until nodes.size
    } yield (nodes(i), nodes(j), clamp(meanP + rnd.nextGaussian() * 0.1))

  /** Truncated-normal probabilities matching a Table II mean/std. */
  private def normalProbs(rnd: Random, mean: Double, std: Double): Double =
    clamp(mean + rnd.nextGaussian() * std)

  // ----------------------------------------------------- dataset stand-ins

  /** Intel Lab-like: 54 sensors, dense connectivity (~969 edges), link
    * delivery probabilities with mean ≈ .33, std ≈ .19 (Table II).
    */
  def intelLabLike(seed: Long = 7L): UncertainGraph = {
    val rnd = new Random(seed)
    val n = 54
    val pairs = for (u <- 0 until n; v <- u + 1 until n) yield (u, v)
    val edges = rnd.shuffle(pairs.toList).take(969)
      .map { case (u, v) => (u, v, normalProbs(rnd, 0.33, 0.19)) }
    UncertainGraph.fromEdges(n, edges)
  }

  /** LastFM-like: power-law social graph, p(u,v) = 1/max(deg u, deg v) —
    * the paper's exact probability rule applied to a BA topology
    * (6 899 nodes / 23 696 edges scaled to 1 200 / ~4 750).
    */
  def lastFmLike(seed: Long = 11L): UncertainGraph = {
    val rnd = new Random(seed)
    val n = 1200
    val topo = hkTopology(n, 4, 0.7, rnd)
    val deg = new Array[Int](n)
    for ((u, v) <- topo) { deg(u) += 1; deg(v) += 1 }
    val edges = topo.map { case (u, v) => (u, v, 1.0 / math.max(deg(u), deg(v)).toDouble) }
    UncertainGraph.fromEdges(n, edges)
  }

  /** Homo Sapiens-like: dense protein-interaction stand-in
    * (18 384 / 995 916 scaled to 1 200 / ~21 000), confidences mean ≈ .32.
    */
  def homoSapiensLike(seed: Long = 13L): UncertainGraph = {
    val rnd = new Random(seed)
    val n = 1200
    val topo = baTopology(n, 18, rnd)
    val edges = topo.map { case (u, v) => (u, v, normalProbs(rnd, 0.32, 0.21)) }
    UncertainGraph.fromEdges(n, edges)
  }

  /** Biomine-like: large sparse biological network stand-in
    * (1 045 414 / 6 742 939 scaled to 6 000 / ~24 000), probs mean ≈ .27.
    */
  def biomineLike(seed: Long = 17L): UncertainGraph = {
    val rnd = new Random(seed)
    val n = 6000
    val topo = baTopology(n, 4, rnd)
    val edges = topo.map { case (u, v) => (u, v, normalProbs(rnd, 0.27, 0.21)) }
    val communities = planted(rnd, Seq(
      ((100 until 112).toSeq, 0.55), ((300 until 311).toSeq, 0.45)))
    UncertainGraph.fromEdges(n, communities ++ edges)
  }

  /** Twitter-like: sparse retweet network stand-in
    * (6 294 565 / 11 063 034 scaled to 8 000 / ~16 000), p = 1 − e^(−t/20)
    * over small retweet counts (mean ≈ .14).
    */
  def twitterLike(seed: Long = 19L): UncertainGraph = {
    val rnd = new Random(seed)
    val n = 8000
    val topo = baTopology(n, 2, rnd)
    val edges = topo.map { case (u, v) =>
      val t = 1 + rnd.nextInt(5)
      (u, v, 1.0 - math.exp(-t / 20.0))
    }
    // Dense co-retweet clusters (high communication counts t).
    val communities = planted(rnd, Seq(
      ((500 until 511).toSeq, 0.45), ((900 until 910).toSeq, 0.4)))
    UncertainGraph.fromEdges(n, communities ++ edges)
  }

  /** Friendster-like: very large, very low probability social network
    * stand-in (65 608 366 / 1.8B scaled to 20 000 / ~60 000), probs mean
    * ≈ .005 — the regime where Table XII compares approximate vs heuristic
    * Edge-NDS.
    */
  def friendsterLike(seed: Long = 23L): UncertainGraph = {
    val rnd = new Random(seed)
    val n = 20000
    val topo = baTopology(n, 3, rnd)
    val edges = topo.map { case (u, v) =>
      (u, v, math.min(0.08, math.max(0.0005, 0.001 + -math.log(rnd.nextDouble()) * 0.004)))
    }
    // One faint recurring friend group — even at Friendster's tiny edge
    // probabilities the paper's Edge-NDS containment is small but nonzero.
    val community = planted(rnd, Seq(((1000 until 1009).toSeq, 0.2)))
      .map { case (u, v, p) => (u, v, math.min(0.3, p)) }
    UncertainGraph.fromEdges(n, community ++ edges)
  }
}
