package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{BruteForce, Graph, Pattern}
import repro.testkit.Check

class DensityNotionSpec extends AnyFunSuite {

  private val notions = Seq[DensityNotion](
    DensityNotion.Edge, DensityNotion.Clique(3), DensityNotion.Clique(4),
    DensityNotion.Pat(Pattern.TwoStar), DensityNotion.Pat(Pattern.Diamond))

  test("densityOf equals instance count over size") {
    Check.forAllGraphs(20, 3, 8) { g =>
      for (n <- notions; s <- Seq(Set(0, 1), (0 until g.n).toSet)) {
        val (num, den) = n.densityOf(g, s)
        assert(den == s.size.toLong)
        assert(num == BruteForce.instancesInside(n.instances(g), s).toLong)
      }
    }
  }

  test("allDensest density equals the best brute-force density for every notion") {
    Check.forAllGraphs(15, 3, 7) { g =>
      for (n <- notions) {
        val w = n.allDensest(g, Int.MaxValue)
        val (bn, bd, all) = BruteForce.allInstanceDensest(g.n, n.instances(g))
        assert(w.num == bn && w.den == bd, n.name)
        assert(w.all.map(_.toSet).toSet == all, n.name)
      }
    }
  }

  test("heuristicDense returns non-empty dense subgraphs when instances exist") {
    Check.forAllGraphs(15, 4, 8) { g =>
      for (n <- notions) {
        val subs = n.heuristicDense(g)
        if (n.instances(g).nonEmpty) {
          assert(subs.nonEmpty, n.name)
          // The best heuristic subgraph achieves at least 1/|V_psi| of the
          // optimum density (the §III-C guarantee).
          val w = n.allDensest(g, 1)
          val q = n.instances(g).headOption.map(_.length).getOrElse(2)
          val best = subs.map { s =>
            val (num, den) = n.densityOf(g, s.toSet)
            num.toDouble / den
          }.max
          assert(best * q >= w.num.toDouble / w.den - 1e-9,
            s"${n.name}: heuristic $best vs optimum ${w.num.toDouble / w.den}")
        } else assert(subs.isEmpty, n.name)
      }
    }
  }

  test("names are stable identifiers") {
    assert(DensityNotion.Edge.name == "edge")
    assert(DensityNotion.Clique(3).name == "3-clique")
    assert(DensityNotion.Pat(Pattern.Diamond).name == "diamond")
  }

  test("empty graph yields empty worlds for every notion") {
    val g = Graph.fromEdges(5, Seq.empty)
    for (n <- notions) {
      val w = n.allDensest(g, 10)
      assert(w.all.isEmpty && w.maxSized.isEmpty && w.num == 0)
    }
  }
}
