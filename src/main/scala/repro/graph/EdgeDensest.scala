package repro.graph

import scala.collection.mutable

/** Exact densest-subgraph machinery for **edge density** (§III-A):
  * Goldberg-style parameterised flow networks, an exact optimal density via
  * Dinkelbach iteration, and enumeration of *all* densest subgraphs through
  * the residual-graph SCCs ([45], Example 4).
  *
  * Convention (matching Table I): a world with zero edges has no densest
  * subgraph — every set ties at density 0, which carries no signal, and the
  * paper credits no node set in such worlds.
  */
object EdgeDensest {

  final case class Result(
      densityNum: Long,
      densityDen: Long,
      all: Seq[Array[Int]],
      capped: Boolean,
      maxSized: Array[Int],
  ) {
    def density: Double = if (densityDen == 0) 0.0 else densityNum.toDouble / densityDen
  }

  private def gcd(a: Long, b: Long): Long = if (b == 0) math.max(a, 1) else gcd(b, a % b)

  /** Charikar peeling lower bound ρ̃ and its witness subgraph. */
  def peel(g: Graph): HyperPeeling.PeelResult =
    HyperPeeling.peel(g.n, Array.tabulate(g.m)(i => Array(g.edgeU(i), g.edgeV(i))))

  /** Build the Goldberg network for the subgraph of `g` induced by `active`
    * at density α = a/b (capacities scaled by b to stay integral):
    * s→v: deg(v)·b, v→t: 2a, each edge: capacity b in both directions.
    * Returns (network, nodeId mapping array, active node list).
    */
  private def network(
      g: Graph, active: Array[Boolean], a: Long, b: Long
  ): (FlowNetwork, Array[Int], Array[Int]) = {
    val nodes = (0 until g.n).filter(active).toArray
    val id = Array.fill(g.n)(-1)
    for (i <- nodes.indices) id(nodes(i)) = i + 2
    val net = new FlowNetwork(nodes.length + 2)
    val s = 0; val t = 1
    val deg = new Array[Long](g.n)
    var e = 0
    while (e < g.m) {
      val u = g.edgeU(e); val v = g.edgeV(e)
      if (active(u) && active(v)) { deg(u) += 1; deg(v) += 1 }
      e += 1
    }
    for (v <- nodes) {
      net.addArc(s, id(v), deg(v) * b)
      net.addArc(id(v), t, 2 * a)
    }
    e = 0
    while (e < g.m) {
      val u = g.edgeU(e); val v = g.edgeV(e)
      if (active(u) && active(v)) net.addArcPair(id(u), id(v), b, b)
      e += 1
    }
    (net, id, nodes)
  }

  private def countEdgesInside(g: Graph, inside: Array[Boolean]): Long = {
    var c = 0L
    var e = 0
    while (e < g.m) {
      if (inside(g.edgeU(e)) && inside(g.edgeV(e))) c += 1
      e += 1
    }
    c
  }

  /** Exact maximum edge density ρ* of any subgraph, with one witness, via
    * Dinkelbach iteration: at guess α = a/b the min cut is < 2bm iff a
    * strictly denser subgraph exists, and the cut's source side is one.
    */
  def maxDensity(g: Graph): (Long, Long, Array[Boolean]) = {
    if (g.m == 0) return (0L, 1L, new Array[Boolean](g.n))
    val pr = peel(g)
    var (a, b) = pr.bestDensity
    var best = pr.bestSuffixNodes
    // Core reduction (Alg 1's use of [45]): every densest subgraph lies in
    // the ceil(ρ̃)-core.
    val active = pr.coreAtLeast((a + b - 1) / b)
    val mActive = countEdgesInside(g, active)
    var improved = true
    while (improved) {
      val gg = gcd(a, b)
      val (net, _, nodes) = network(g, active, a / gg, b / gg)
      val flow = net.maxFlow(0, 1)
      if (flow < 2L * (b / gg) * mActive) {
        val cut = net.minCutSourceSide(0)
        val v1 = new Array[Boolean](g.n)
        for (i <- nodes.indices; if cut(i + 2)) v1(nodes(i)) = true
        val e1 = countEdgesInside(g, v1)
        val n1 = v1.count(identity).toLong
        require(n1 > 0 && e1 * b > a * n1, "Dinkelbach step must strictly improve")
        a = e1; b = n1; best = v1
      } else improved = false
    }
    val gg = gcd(a, b)
    (a / gg, b / gg, best)
  }

  /** All densest subgraphs (plus the maximum-sized one) — Line 5 of
    * Algorithm 1, via the method of [45].
    */
  def allDensest(g: Graph, maxResults: Int = Int.MaxValue): Result = {
    if (g.m == 0) return Result(0, 1, Seq.empty, capped = false, Array.empty)
    val (a, b, _) = maxDensity(g)
    val pr = peel(g)
    val active = pr.coreAtLeast({ val (pa, pb) = pr.bestDensity; (pa + pb - 1) / pb })
    val (net, _, nodes) = network(g, active, a, b)
    net.maxFlow(0, 1)
    val res = net.residualAdjacency
    val vOf = (id: Int) => if (id >= 2) nodes(id - 2) else -1
    val e = DensestEnum.enumerate(res, 0, 1, vOf, maxResults)
    Result(a, b, e.all, e.capped, e.maxSized)
  }
}
