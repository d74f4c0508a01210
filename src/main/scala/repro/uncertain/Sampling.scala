package repro.uncertain

import scala.util.Random

/** Possible-world samplers (§III-A remark 2, §VI-G): Monte Carlo, a
  * Lazy-Propagation-style sampler [53], and Recursive-Stratified-style
  * sampling [54]. All three draw worlds from the same distribution (MC and
  * LP exactly; RSS by proportional stratification, which is what lowers its
  * variance); Tables XIII–XIV compare their θ at convergence, running time
  * and memory overhead.
  *
  * The API is index-based — `worldForIndex(g, i, theta, seed)` — so a Spark
  * task can materialise world `i` independently of the others.
  */
sealed trait WorldSampler extends Serializable {
  def name: String

  /** Edge-presence mask of sample `i` of a planned run of `theta` samples. */
  def worldForIndex(g: UncertainGraph, i: Long, theta: Int, seed: Long): Array[Boolean]

  /** Auxiliary bookkeeping memory in bytes beyond plain MC (analytic; the
    * paper reports process RSS, which a JVM cannot attribute per strategy).
    */
  def auxiliaryBytes(g: UncertainGraph, theta: Int): Long
}

object WorldSampler {

  /** Independent Bernoulli draw per edge. */
  case object MonteCarlo extends WorldSampler {
    val name = "MC"
    def worldForIndex(g: UncertainGraph, i: Long, theta: Int, seed: Long): Array[Boolean] = {
      val rnd = Rnd.forWorld(seed, i)
      Array.tabulate(g.m)(e => rnd.nextDouble() < g.prob(e))
    }
    def auxiliaryBytes(g: UncertainGraph, theta: Int): Long = 0L
  }

  /** Lazy-Propagation-style sampler: identical world distribution to MC but
    * maintains per-edge visit/hit counters (the bookkeeping that [53] uses
    * to reuse draws across queries) — the memory overhead Table XIII
    * measures. Counters live in a thread-local accumulator per task.
    */
  case object LazyPropagation extends WorldSampler {
    val name = "LP"
    private val visits = new ThreadLocal[Array[Long]]
    def worldForIndex(g: UncertainGraph, i: Long, theta: Int, seed: Long): Array[Boolean] = {
      if (visits.get == null || visits.get.length != g.m) visits.set(new Array[Long](g.m))
      val counters = visits.get
      val rnd = Rnd.forWorld(seed, i)
      Array.tabulate(g.m) { e =>
        counters(e) += 1
        rnd.nextDouble() < g.prob(e)
      }
    }
    def auxiliaryBytes(g: UncertainGraph, theta: Int): Long = 8L * g.m
  }

  /** Recursive-Stratified-style sampling: stratify on the `r` most
    * uncertain edges (probability closest to 1/2). The 2^r strata are
    * allocated samples proportionally to their exact probability; within a
    * stratum the selected edges are fixed and the rest drawn independently.
    * Proportional allocation keeps the estimator unbiased while removing
    * the variance of the stratified edges.
    */
  final case class RecursiveStratified(r: Int = 4) extends WorldSampler {
    val name = "RSS"

    private def strataEdges(g: UncertainGraph): Array[Int] =
      (0 until g.m).sortBy(e => math.abs(g.prob(e) - 0.5)).take(math.min(r, g.m)).toArray

    /** Stratum of sample index i under proportional allocation. */
    private def stratumOf(g: UncertainGraph, i: Long, theta: Int): (Array[Int], Long) = {
      val es = strataEdges(g)
      val k = es.length
      val nStrata = 1 << k
      // Cumulative allocation by stratum probability; sample i falls in the
      // first stratum whose cumulative share exceeds i.
      var acc = 0.0
      var s = 0
      val x = (i + 0.5) / theta
      while (s < nStrata - 1) {
        var pr = 1.0
        for (j <- 0 until k)
          pr *= (if ((s & (1 << j)) != 0) g.prob(es(j)) else 1.0 - g.prob(es(j)))
        acc += pr
        if (x < acc) return (es, s.toLong)
        s += 1
      }
      (es, (nStrata - 1).toLong)
    }

    def worldForIndex(g: UncertainGraph, i: Long, theta: Int, seed: Long): Array[Boolean] = {
      val (es, s) = stratumOf(g, i, theta)
      val fixed = es.zipWithIndex.map { case (e, j) => e -> ((s & (1L << j)) != 0) }.toMap
      val rnd = Rnd.forWorld(seed, i)
      Array.tabulate(g.m)(e => fixed.getOrElse(e, rnd.nextDouble() < g.prob(e)))
    }

    def auxiliaryBytes(g: UncertainGraph, theta: Int): Long = {
      val k = math.min(r, g.m)
      // Stratum table (probability + allocation per stratum) + edge index.
      (16L << k) + 4L * k
    }
  }

  val all: Seq[WorldSampler] = Seq(MonteCarlo, LazyPropagation, RecursiveStratified())
}
