package repro.graph

/** Brute-force reference implementations used to validate every densest
  * subgraph / core / enumeration algorithm on small graphs (n <= ~9).
  */
object BruteForce {

  /** All non-empty node subsets of 0 until n. */
  def subsets(n: Int): Iterator[Set[Int]] =
    Iterator.range(1, 1 << n).map(mask => (0 until n).filter(i => (mask & (1 << i)) != 0).toSet)

  def edgesInside(g: Graph, s: Set[Int]): Int =
    (0 until g.m).count(i => s.contains(g.edgeU(i)) && s.contains(g.edgeV(i)))

  /** Instances (given as node sets) fully inside s. */
  def instancesInside(instances: Array[Array[Int]], s: Set[Int]): Int =
    instances.count(_.forall(s.contains))

  /** (bestNum, bestDen, all subsets achieving the max density); empty when
    * the graph has no instance (matching the repo convention that an
    * instance-free world has no densest subgraph).
    */
  def allDensestBy(n: Int, weight: Set[Int] => Int): (Long, Long, Set[Set[Int]]) = {
    var bn = 0L; var bd = 1L
    var best = Set.empty[Set[Int]]
    for (s <- subsets(n)) {
      val num = weight(s).toLong; val den = s.size.toLong
      if (num > 0) {
        if (num * bd > bn * den) { bn = num; bd = den; best = Set(s) }
        else if (num * bd == bn * den) best += s
      }
    }
    val g = gcd(bn, bd)
    if (best.isEmpty) (0L, 1L, Set.empty) else (bn / g, bd / g, best)
  }

  def allEdgeDensest(g: Graph): (Long, Long, Set[Set[Int]]) =
    allDensestBy(g.n, s => edgesInside(g, s))

  def allInstanceDensest(n: Int, instances: Array[Array[Int]]): (Long, Long, Set[Set[Int]]) =
    allDensestBy(n, s => instancesInside(instances, s))

  /** (k)-core of a graph w.r.t. instance degrees by naive fixpoint removal. */
  def instanceCore(n: Int, instances: Array[Array[Int]], k: Int): Set[Int] = {
    var alive = (0 until n).toSet
    var changed = true
    while (changed) {
      val deg = alive.map { v =>
        v -> instances.count(inst => inst.contains(v) && inst.forall(alive.contains))
      }.toMap
      val drop = alive.filter(deg(_) < k)
      changed = drop.nonEmpty
      alive = alive -- drop
    }
    alive
  }

  /** Pattern-instance counts by independent per-subset counting. */
  def countTwoStars(g: Graph): Int =
    (0 until g.n).map(v => { val d = g.degree(v); d * (d - 1) / 2 }).sum

  def countThreeStars(g: Graph): Int =
    (0 until g.n).map(v => { val d = g.degree(v); d * (d - 1) * (d - 2) / 6 }).sum

  def countPaws(g: Graph): Int = {
    var c = 0
    for (t <- Cliques.enumerate(g, 3); x <- t; d <- g.adj(x); if !t.contains(d)) c += 1
    c
  }

  def countDiamonds(g: Graph): Int = {
    var c = 0
    for (i <- 0 until g.m) {
      val u = g.edgeU(i); val v = g.edgeV(i)
      val common = g.adj(u).count(w => w != v && g.hasEdge(v, w))
      c += common * (common - 1) / 2
    }
    c
  }

  def gcd(a: Long, b: Long): Long = if (b == 0) math.max(a, 1) else gcd(b, a % b)
}
