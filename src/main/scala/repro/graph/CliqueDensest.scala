package repro.graph

/** Algorithms 2/3/6: exact maximum h-clique density and enumeration of
  * **all** h-clique densest subgraphs of a deterministic graph — the paper's
  * novel subroutine for h-Clique-MPDS (§III-B).
  *
  * The optimal density ρ*_h is computed by Dinkelbach iteration over the
  * same flow network used for enumeration (substitution for the convex
  * program of [56] — see DESIGN.md §4; both are exact, by Lemma 3 the min
  * cut at guess α is < h·μ_h·b iff a subgraph with density > α exists).
  */
object CliqueDensest {

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

  /** Flow network of Algorithm 6 on the (core-reduced) graph `gc` whose
    * h-cliques are `cliques`, at α = a/b, capacities scaled by b:
    * s→v: deg(v,h)·b ; v→t: h·a ; λ→v (v∈λ): ∞ ; v→λ: b when λ∪{v} is an
    * h-clique. Network node ids: 0=s, 1=t, 2..: active V nodes, then Λ.
    */
  private def network(
      n: Int,
      cliques: Array[Array[Int]],
      active: Array[Boolean],
      a: Long,
      b: Long,
  ): (FlowNetwork, Array[Int], Int) = {
    val nodes = (0 until n).filter(active).toArray
    val id = Array.fill(n)(-1)
    for (i <- nodes.indices) id(nodes(i)) = i + 2
    val (lambdas, completions) = Cliques.subCliquesWithCompletions(cliques)
    val h = if (cliques.nonEmpty) cliques(0).length.toLong else 2L
    val net = new FlowNetwork(nodes.length + lambdas.length + 2)
    val s = 0; val t = 1
    val deg = Cliques.degrees(n, cliques)
    for (v <- nodes) {
      net.addArc(s, id(v), deg(v).toLong * b)
      net.addArc(id(v), t, h * a)
    }
    for (li <- lambdas.indices) {
      val lid = nodes.length + 2 + li
      for (v <- lambdas(li)) net.addArc(lid, id(v), FlowNetwork.Inf)
      for (v <- completions(li)) net.addArc(id(v), lid, b)
    }
    (net, nodes, nodes.length)
  }

  /** All h-clique densest subgraphs of `g` (Algorithm 2). */
  def allDensest(g: Graph, h: Int, maxResults: Int = Int.MaxValue): Result = {
    val cliquesAll = Cliques.enumerate(g, h)
    if (cliquesAll.isEmpty) return Result(0, 1, Seq.empty, capped = false, Array.empty)

    // Lines 1-2: peeling lower bound ρ̃ and (⌈ρ̃⌉, h)-core reduction.
    val pr = HyperPeeling.peel(g.n, cliquesAll)
    var (a, b) = pr.bestDensity
    val active = pr.coreAtLeast((a + b - 1) / b)
    val gc = g.inducedSubgraph(active)
    val cliques = Cliques.enumerate(gc, h) // Line 3's Λ comes from these
    val muC = cliques.length.toLong
    val hh = h.toLong

    // Line 4 (ρ*_h) via Dinkelbach on the Algorithm 6 network.
    var improved = true
    while (improved) {
      val gg = gcd(a, b)
      val (net, nodes, _) = network(g.n, cliques, active, a / gg, b / gg)
      val flow = net.maxFlow(0, 1)
      if (flow < hh * muC * (b / gg)) {
        val cut = net.minCutSourceSide(0)
        val v1 = new Array[Boolean](g.n)
        for (i <- nodes.indices; if cut(i + 2)) v1(nodes(i)) = true
        val mu1 = Cliques.countInside(cliques, v1)
        val n1 = v1.count(identity).toLong
        require(n1 > 0 && mu1 * b > a * n1, "Dinkelbach step must strictly improve")
        a = mu1; b = n1
      } else improved = false
    }
    val gg = gcd(a, b)
    a /= gg; b /= gg

    // Lines 5-8: max flow at α = ρ*_h, residual SCCs, Algorithm 3.
    val (net, nodes, nActive) = network(g.n, cliques, active, a, b)
    net.maxFlow(0, 1)
    val res = net.residualAdjacency
    val vOf = (nid: Int) => if (nid >= 2 && nid < nActive + 2) nodes(nid - 2) else -1
    val e = DensestEnum.enumerate(res, 0, 1, vOf, maxResults)
    Result(a, b, e.all, e.capped, e.maxSized)
  }
}
