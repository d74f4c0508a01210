package repro.core

import repro.SparkSpec
import repro.uncertain.UncertainGraph
import repro.graph.BruteForce
import repro.testkit.Check
import scala.util.Random

class ExactMPDSSpec extends SparkSpec {

  private def fig1 = UncertainGraph.fromEdges(4,
    Seq((0, 1, 0.4), (0, 2, 0.4), (1, 3, 0.7))) // A=0,B=1,C=2,D=3

  test("Table I: exact densest subgraph probabilities of the Figure 1 graph") {
    val tau = ExactMPDS.tauDF(spark, fig1, DensityNotion.Edge)
      .collect().map(r => r.getString(0) -> r.getDouble(1)).toMap
    def t(s: String) = tau.getOrElse(s, 0.0)
    assert(math.abs(t("0,1") - 0.072) < 1e-9)      // {A,B}  = 0.07
    assert(math.abs(t("0,2") - 0.24) < 1e-9)       // {A,C}  = 0.24
    assert(math.abs(t("1,3") - 0.42) < 1e-9)       // {B,D}  = 0.42
    assert(math.abs(t("0,1,2") - 0.048) < 1e-9)    // {A,B,C} = 0.05
    assert(math.abs(t("0,1,3") - 0.168) < 1e-9)    // {A,B,D} = 0.17
    assert(math.abs(t("0,1,2,3") - 0.28) < 1e-9)   // {A,B,C,D} = 0.28
  }

  test("Table I: the MPDS is {B,D} with tau = 0.42") {
    val top = ExactMPDS.topK(spark, fig1, DensityNotion.Edge, 1)
    assert(top.head.nodes == Seq(1, 3))
    assert(math.abs(top.head.tau - 0.42) < 1e-9)
  }

  test("Example 3: gamma({B,D}) = 0.7") {
    val g = ExactMPDS.gammaOf(spark, fig1, DensityNotion.Edge, Set(1, 3))
    assert(math.abs(g - 0.7) < 1e-9)
  }

  test("exact tau matches a driver-side brute force on random graphs") {
    val rnd = new Random(101)
    for (_ <- 0 until 5) {
      val det = Check.randomGraph(rnd, 3, 5)
      if (det.m > 0 && det.m <= 8) {
        val ug = UncertainGraph(det.n, det.edgeU, det.edgeV, Check.randomProbs(rnd, det.m))
        // Driver-side brute force: enumerate worlds, brute densest families.
        val brute = collection.mutable.Map.empty[String, Double].withDefaultValue(0.0)
        for (mask <- 0L until (1L << ug.m)) {
          val present = ug.worldOfMask(mask)
          val pr = ug.worldProbability(present)
          val world = ug.world(present)
          val (_, _, all) = BruteForce.allEdgeDensest(world)
          for (s <- all) brute(s.toSeq.sorted.mkString(",")) += pr
        }
        val got = ExactMPDS.tauDF(spark, ug, DensityNotion.Edge)
          .collect().map(r => r.getString(0) -> r.getDouble(1)).toMap
        assert(got.keySet == brute.keySet)
        for ((k, v) <- brute) assert(math.abs(got(k) - v) < 1e-9, s"set $k")
      }
    }
  }

  test("exact tau values sum to <= 1 per density notion (worlds may credit many sets)") {
    // Each world distributes its probability to every densest subgraph, so
    // the sum over sets equals E[#densest subgraphs] >= total world mass
    // with at least one edge.
    val tau = ExactMPDS.tauDF(spark, fig1, DensityNotion.Edge)
      .collect().map(_.getDouble(1)).sum
    // Worlds G2..G8 have mass 0.892; G7 credits 3 sets (adds 2*0.168).
    assert(math.abs(tau - (0.892 + 2 * 0.168)) < 1e-9)
  }

  test("exact 3-clique MPDS on a small graph with a high-probability triangle") {
    val ug = UncertainGraph.fromEdges(5, Seq(
      (0, 1, 0.9), (1, 2, 0.9), (0, 2, 0.9), // strong triangle
      (2, 3, 0.5), (3, 4, 0.5), (2, 4, 0.5), // weak triangle
    ))
    val top = ExactMPDS.topK(spark, ug, DensityNotion.Clique(3), 1)
    assert(top.head.nodes == Seq(0, 1, 2))
    // {0,1,2} is densest iff it exists and the weak triangle is not fully
    // alive (if both live, the union has density 2/5 > 1/3):
    // tau = 0.9^3 * (1 - 0.5^3) = 0.637875.
    assert(math.abs(top.head.tau - 0.729 * 0.875) < 1e-9)
  }
}
