package repro.uncertain

import org.scalatest.funsuite.AnyFunSuite
import repro.testkit.Check
import scala.util.Random

class CoreTrussSpec extends AnyFunSuite {

  /** Brute-force (k,η)-core: iteratively drop nodes with η-degree < k. */
  private def bruteEtaCore(g: UncertainGraph, eta: Double, k: Int): Set[Int] = {
    var alive = (0 until g.n).toSet
    var changed = true
    while (changed) {
      val etaDeg = alive.map { v =>
        val incident = (0 until g.m).filter { i =>
          (g.edgeU(i) == v && alive.contains(g.edgeV(i))) ||
            (g.edgeV(i) == v && alive.contains(g.edgeU(i)))
        }.map(g.prob).toArray
        v -> PoissonBinomial.maxKWithTail(incident, eta)
      }.toMap
      val drop = alive.filter(etaDeg(_) < k)
      changed = drop.nonEmpty
      alive --= drop
    }
    alive
  }

  test("(k,eta)-core numbers match brute-force fixpoint for all k") {
    val rnd = new Random(31)
    for (_ <- 0 until 15) {
      val det = Check.randomGraph(rnd, 3, 8)
      val ug = UncertainGraph(det.n, det.edgeU, det.edgeV, Check.randomProbs(rnd, det.m))
      val eta = 0.1 + rnd.nextDouble() * 0.5
      val core = UncertainCore.coreNumbers(ug, eta)
      for (k <- 0 to core.max + 1) {
        val got = (0 until ug.n).filter(core(_) >= k).toSet
        assert(got == bruteEtaCore(ug, eta, k), s"eta=$eta k=$k")
      }
    }
  }

  test("innermost eta-core is non-empty on a graph with edges") {
    val ug = repro.data.Datasets.karate()
    val inner = UncertainCore.innermostCore(ug, 0.1)
    assert(inner.nonEmpty)
  }

  test("high-probability triangle survives truss peeling at k=3") {
    // Triangle with p=0.9 everywhere plus a pendant low-prob edge.
    val ug = UncertainGraph.fromEdges(4,
      Seq((0, 1, 0.9), (1, 2, 0.9), (0, 2, 0.9), (2, 3, 0.1)))
    val truss = UncertainTruss.trussNumbers(ug, 0.1)
    // The three triangle edges should share the maximal truss number and
    // outlast the pendant edge.
    val triEdges = (0 until ug.m).filter(e => Set((0, 1), (1, 2), (0, 2))
      .contains((ug.edgeU(e), ug.edgeV(e))))
    val pendant = (0 until ug.m).find(e => (ug.edgeU(e), ug.edgeV(e)) == (2, 3)).get
    assert(triEdges.map(truss).distinct.size == 1)
    assert(truss(pendant) < triEdges.map(truss).head)
    assert(UncertainTruss.innermostTruss(ug, 0.1) == Set(0, 1, 2))
  }

  test("gamma-truss: edge with p < gamma is peeled first") {
    val ug = UncertainGraph.fromEdges(3, Seq((0, 1, 0.05), (1, 2, 0.9), (0, 2, 0.9)))
    val truss = UncertainTruss.trussNumbers(ug, 0.1)
    val weak = (0 until ug.m).find(e => ug.prob(e) == 0.05).get
    assert(truss(weak) == truss.min)
  }

  test("truss numbers are monotone under gamma") {
    val rnd = new Random(41)
    val det = Check.randomGraph(rnd, 5, 8)
    if (det.m > 0) {
      val ug = UncertainGraph(det.n, det.edgeU, det.edgeV, Check.randomProbs(rnd, det.m))
      val loose = UncertainTruss.trussNumbers(ug, 0.05)
      val strict = UncertainTruss.trussNumbers(ug, 0.5)
      // A stricter gamma can only reduce supports, hence truss numbers.
      for (e <- 0 until ug.m) assert(strict(e) <= loose(e))
    }
  }
}
