package repro.uncertain

import scala.collection.mutable

/** (k, η)-core decomposition of an uncertain graph (Bonchi et al. [40]) —
  * one of the dense-subgraph baselines the paper compares against
  * (Tables III–VI).
  *
  * The η-degree of a node is the largest k such that
  * Pr[at least k incident edges exist] >= η; the (k,η)-core is the maximal
  * subgraph whose nodes all have η-degree >= k within it. Peeling the
  * minimum η-degree node yields the η-core numbers.
  */
object UncertainCore {

  /** η-core number of every node. */
  def coreNumbers(g: UncertainGraph, eta: Double): Array[Int] = {
    val n = g.n
    val inc = Array.fill(n)(mutable.ArrayBuffer.empty[Int]) // incident edge ids
    for (i <- 0 until g.m) { inc(g.edgeU(i)) += i; inc(g.edgeV(i)) += i }
    val removed = new Array[Boolean](n)
    val edgeAlive = Array.fill(g.m)(true)
    val core = new Array[Int](n)

    def etaDeg(v: Int): Int =
      PoissonBinomial.maxKWithTail(inc(v).filter(edgeAlive).map(g.prob).toArray, eta)

    val deg = Array.tabulate(n)(etaDeg)
    var level = 0
    var left = n
    while (left > 0) {
      val candidates = (0 until n).filter(v => !removed(v) && deg(v) <= level)
      if (candidates.isEmpty) level += 1
      else {
        val queue = mutable.Queue(candidates: _*)
        while (queue.nonEmpty) {
          val v = queue.dequeue()
          if (!removed(v)) {
            removed(v) = true
            core(v) = level
            left -= 1
            for (e <- inc(v); if edgeAlive(e)) {
              edgeAlive(e) = false
              val w = if (g.edgeU(e) == v) g.edgeV(e) else g.edgeU(e)
              if (!removed(w)) {
                deg(w) = etaDeg(w)
                if (deg(w) <= level) queue.enqueue(w)
              }
            }
          }
        }
      }
    }
    core
  }

  /** Node set of the innermost η-core (maximum k with non-empty core). */
  def innermostCore(g: UncertainGraph, eta: Double): Set[Int] = {
    val core = coreNumbers(g, eta)
    val kMax = core.max
    (0 until g.n).filter(core(_) == kMax).toSet
  }
}
