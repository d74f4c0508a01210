package repro.graph

import scala.collection.mutable

/** Generic "instance peeling" over a graph: an *instance* is a small node set
  * (an edge, an h-clique, or a ψ-instance). Peeling repeatedly removes the
  * node contained in the fewest live instances. This single substrate yields:
  *
  *   - Charikar's peeling lower bound for edge density [2] (instances=edges),
  *   - the peeling method of [19]/[5] for clique/pattern density (Alg 2/4 line 1),
  *   - (k,h)-core and (k,ψ)-core membership (Alg 2/4 line 2, Definition 7),
  *   - the heuristic of §III-C's remark (innermost core + denser suffixes).
  */
object HyperPeeling {

  /** Result of a full peel of `n` nodes against `instances`.
    *
    * `order(k)` is the k-th removed node, `suffixInstances(k)` the number of
    * live instances just before removing it, and `coreNumber(v)` the usual
    * monotone core number (max over prefixes of degree-at-removal).
    */
  final case class PeelResult(
      n: Int,
      order: Array[Int],
      coreNumber: Array[Int],
      suffixInstances: Array[Long],
  ) {

    /** Best suffix density as an exact rational (numerator, denominator);
      * (0, 1) for an instance-free graph.
      */
    def bestDensity: (Long, Long) = {
      var bn = 0L; var bd = 1L
      var k = 0
      while (k < n) {
        val num = suffixInstances(k); val den = (n - k).toLong
        if (num * bd > bn * den) { bn = num; bd = den }
        k += 1
      }
      (bn, bd)
    }

    /** Node mask of the best-density suffix (the peeling's candidate). */
    def bestSuffixNodes: Array[Boolean] = {
      val (bn, bd) = bestDensity
      var k = 0
      var best = 0
      while (k < n) {
        if (suffixInstances(k) * bd == bn * (n - k).toLong) { best = k; k = n }
        else k += 1
      }
      val keep = new Array[Boolean](n)
      var i = best
      while (i < n) { keep(order(i)) = true; i += 1 }
      keep
    }

    /** Mask of the (k,·)-core: nodes with core number >= k. */
    def coreAtLeast(k: Long): Array[Boolean] = coreNumber.map(_.toLong >= k)

    /** Maximum core number. */
    def kMax: Int = if (n == 0) 0 else coreNumber.max

    /** Mask of the innermost core (core number == kMax). */
    def innermost: Array[Boolean] = { val km = kMax; coreNumber.map(_ == km) }

    /** §III-C heuristic: the innermost core plus every peel suffix strictly
      * denser than it, as node masks (densest first by density).
      */
    def heuristicDenseSubgraphs: Seq[Array[Boolean]] = {
      val inner = innermost
      val innerCount = inner.count(identity)
      // Density of the innermost core suffix: find the first peel step whose
      // remaining node set is exactly the innermost core.
      val innerStart = n - innerCount
      val innerNum = if (innerStart < n) suffixInstances(innerStart) else 0L
      val innerDen = math.max(1L, innerCount.toLong)
      val out = mutable.ArrayBuffer.empty[(Array[Boolean], Long, Long)]
      out += ((inner, innerNum, innerDen))
      var k = 0
      while (k < n) {
        val num = suffixInstances(k); val den = (n - k).toLong
        if (num * innerDen > innerNum * den) {
          val keep = new Array[Boolean](n)
          var i = k
          while (i < n) { keep(order(i)) = true; i += 1 }
          out += ((keep, num, den))
        }
        k += 1
      }
      out.sortBy { case (_, num, den) => -num.toDouble / den }.map(_._1).toSeq
    }
  }

  /** Peel all `n` nodes against `instances` (node-id sets, ids < n). */
  def peel(n: Int, instances: Array[Array[Int]]): PeelResult = {
    val nInst = instances.length
    val deg = new Array[Int](n)
    val instByNode = {
      val builders = Array.fill(n)(mutable.ArrayBuilder.make[Int])
      var i = 0
      while (i < nInst) {
        for (v <- instances(i)) { builders(v) += i; deg(v) += 1 }
        i += 1
      }
      builders.map(_.result())
    }
    val alive = Array.fill(nInst)(true)
    val removed = new Array[Boolean](n)
    val order = new Array[Int](n)
    val coreNumber = new Array[Int](n)
    val suffix = new Array[Long](n)
    // Lazy-deletion priority queue keyed by current instance degree.
    val pq = new java.util.PriorityQueue[Long](math.max(1, n))
    for (v <- 0 until n) pq.add(deg(v).toLong << 32 | v)
    var live = nInst.toLong
    var core = 0
    var k = 0
    while (k < n) {
      var v = -1
      while (v < 0) {
        val top = pq.poll()
        val cand = (top & 0xffffffffL).toInt
        if (!removed(cand) && (top >>> 32) == deg(cand)) v = cand
      }
      suffix(k) = live
      core = math.max(core, deg(v))
      coreNumber(v) = core
      removed(v) = true
      order(k) = v; k += 1
      for (i <- instByNode(v); if alive(i)) {
        alive(i) = false
        live -= 1
        for (w <- instances(i); if !removed(w)) {
          deg(w) -= 1
          pq.add(deg(w).toLong << 32 | w)
        }
      }
    }
    PeelResult(n, order, coreNumber, suffix)
  }
}
