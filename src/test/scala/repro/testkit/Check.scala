package repro.testkit

import repro.graph.Graph
import scala.util.Random

/** Deterministic property-testing helper (the offline cache has no
  * scalatest/scalacheck bridge, so suites drive ScalaCheck-style trials
  * through this seeded generator instead).
  */
object Check {

  def randomGraph(rnd: Random, minN: Int, maxN: Int): Graph = {
    val n = minN + rnd.nextInt(maxN - minN + 1)
    val p = 0.15 + rnd.nextDouble() * 0.7
    val edges = for {
      u <- 0 until n
      v <- u + 1 until n
      if rnd.nextDouble() < p
    } yield (u, v)
    Graph.fromEdges(n, edges)
  }

  /** Run `f` over `trials` random graphs; failures report the trial index. */
  def forAllGraphs(trials: Int, minN: Int, maxN: Int, seed: Long = 20260813L)(
      f: Graph => Unit
  ): Unit = {
    val rnd = new Random(seed)
    for (t <- 0 until trials) {
      val g = randomGraph(rnd, minN, maxN)
      try f(g)
      catch {
        case e: Throwable =>
          throw new AssertionError(
            s"property failed on trial $t (n=${g.n}, edges=${
              (0 until g.m).map(i => (g.edgeU(i), g.edgeV(i))).mkString(",")
            })", e)
      }
    }
  }

  /** Random uncertain-graph probabilities for m edges. */
  def randomProbs(rnd: Random, m: Int): Array[Double] =
    Array.fill(m)(0.05 + rnd.nextDouble() * 0.9)
}
