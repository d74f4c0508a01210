package repro.graph

/** Algorithms 4/7: exact maximum pattern density and enumeration of **all**
  * ψ-densest subgraphs of a deterministic graph (§III-C). The flow network
  * has one node per *group* of ψ-instances sharing a node set (Algorithm 7),
  * with capacities v'→λ': |g|·b and λ'→v': |g|(|V_ψ|−1)·b; by Lemma 11 the
  * min cut at guess α is < |V_ψ|·μ_ψ·b iff a denser subgraph exists, so the
  * same Dinkelbach + residual-SCC machinery as CliqueDensest applies.
  */
object PatternDensest {

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

  private def countInside(sets: Array[Array[Int]], counts: Array[Int], inside: Array[Boolean]): Long = {
    var c = 0L
    var i = 0
    while (i < sets.length) {
      if (sets(i).forall(inside)) c += counts(i)
      i += 1
    }
    c
  }

  private def network(
      n: Int,
      q: Long, // |V_ψ|
      groupSets: Array[Array[Int]],
      groupCounts: Array[Int],
      deg: Array[Long],
      active: Array[Boolean],
      a: Long,
      b: Long,
  ): (FlowNetwork, Array[Int], Int) = {
    val nodes = (0 until n).filter(active).toArray
    val id = Array.fill(n)(-1)
    for (i <- nodes.indices) id(nodes(i)) = i + 2
    val net = new FlowNetwork(nodes.length + groupSets.length + 2)
    val s = 0; val t = 1
    for (v <- nodes) {
      net.addArc(s, id(v), deg(v) * b)
      net.addArc(id(v), t, q * a)
    }
    for (gi <- groupSets.indices) {
      val gid = nodes.length + 2 + gi
      val c = groupCounts(gi).toLong
      for (v <- groupSets(gi)) {
        net.addArc(id(v), gid, c * b)
        net.addArc(gid, id(v), c * (q - 1) * b)
      }
    }
    (net, nodes, nodes.length)
  }

  /** All ψ-densest subgraphs of `g` (Algorithm 4). */
  def allDensest(g: Graph, psi: Pattern, maxResults: Int = Int.MaxValue): Result = {
    val instAll = psi.instances(g)
    if (instAll.isEmpty) return Result(0, 1, Seq.empty, capped = false, Array.empty)

    // Lines 1-2: peeling lower bound and (⌈ρ̃⌉, ψ)-core reduction.
    val pr = HyperPeeling.peel(g.n, instAll)
    var (a, b) = pr.bestDensity
    val active = pr.coreAtLeast((a + b - 1) / b)
    val gc = g.inducedSubgraph(active)
    val inst = psi.instances(gc) // Line 3: Λ on the reduced graph
    val (groupSets, groupCounts) = Pattern.groups(inst)
    val mu = inst.length.toLong
    val q = psi.numNodes.toLong
    val deg = Pattern.degrees(g.n, inst).map(_.toLong)

    // Line 4 (ρ*_ψ) via Dinkelbach on the Algorithm 7 network.
    var improved = true
    while (improved) {
      val gg = gcd(a, b)
      val (net, nodes, _) =
        network(g.n, q, groupSets, groupCounts, deg, active, a / gg, b / gg)
      val flow = net.maxFlow(0, 1)
      if (flow < q * mu * (b / gg)) {
        val cut = net.minCutSourceSide(0)
        val v1 = new Array[Boolean](g.n)
        for (i <- nodes.indices; if cut(i + 2)) v1(nodes(i)) = true
        val mu1 = countInside(groupSets, groupCounts, v1)
        val n1 = v1.count(identity).toLong
        require(n1 > 0 && mu1 * b > a * n1, "Dinkelbach step must strictly improve")
        a = mu1; b = n1
      } else improved = false
    }
    val gg = gcd(a, b)
    a /= gg; b /= gg

    // Lines 5-8: flow at α = ρ*_ψ, residual SCCs, Algorithm 3.
    val (net, nodes, nActive) =
      network(g.n, q, groupSets, groupCounts, deg, active, a, b)
    net.maxFlow(0, 1)
    val res = net.residualAdjacency
    val vOf = (nid: Int) => if (nid >= 2 && nid < nActive + 2) nodes(nid - 2) else -1
    val e = DensestEnum.enumerate(res, 0, 1, vOf, maxResults)
    Result(a, b, e.all, e.capped, e.maxSized)
  }
}
