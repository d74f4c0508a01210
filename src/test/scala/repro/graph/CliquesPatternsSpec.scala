package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import repro.testkit.Check

class CliquesPatternsSpec extends AnyFunSuite {

  private def bruteCliques(g: Graph, h: Int): Set[Set[Int]] =
    BruteForce.subsets(g.n)
      .filter(_.size == h)
      .filter(s => s.toSeq.combinations(2).forall { case Seq(a, b) => g.hasEdge(a, b) })
      .toSet

  test("h-clique enumeration matches brute force for h=2..5") {
    Check.forAllGraphs(30, 3, 9) { g =>
      for (h <- 2 to 5) {
        val got = Cliques.enumerate(g, h).map(_.toSet).toSet
        assert(got == bruteCliques(g, h), s"h=$h")
        // No duplicates either.
        assert(Cliques.enumerate(g, h).length == got.size)
      }
    }
  }

  test("clique degrees sum to h * #cliques") {
    Check.forAllGraphs(20, 3, 9) { g =>
      for (h <- 2 to 4) {
        val cl = Cliques.enumerate(g, h)
        assert(Cliques.degrees(g.n, cl).sum == h * cl.length)
      }
    }
  }

  test("triangle count on K5 is C(5,3)=10") {
    val k5 = Graph.fromEdges(5, for (u <- 0 until 5; v <- u + 1 until 5) yield (u, v))
    assert(Cliques.enumerate(k5, 3).length == 10)
    assert(Cliques.enumerate(k5, 4).length == 5)
    assert(Cliques.enumerate(k5, 5).length == 1)
  }

  test("subCliquesWithCompletions: every lambda+completion is an h-clique") {
    Check.forAllGraphs(20, 3, 9) { g =>
      val cl = Cliques.enumerate(g, 3)
      val (lambdas, comps) = Cliques.subCliquesWithCompletions(cl)
      val cliqueSet = cl.map(_.toSet).toSet
      for (i <- lambdas.indices; v <- comps(i)) {
        assert(cliqueSet.contains(lambdas(i).toSet + v))
      }
      // Each h-clique contributes h (lambda, completion) pairs.
      assert(comps.map(_.length).sum == 3 * cl.length)
      // Lambdas are exactly the distinct (h-1)-subsets of h-cliques.
      val expected = cl.flatMap(c => c.indices.map(i => c.toSet - c(i))).toSet
      assert(lambdas.map(_.toSet).toSet == expected)
    }
  }

  test("pattern instance counts match closed-form brute force") {
    Check.forAllGraphs(30, 3, 9) { g =>
      assert(Pattern.TwoStar.instances(g).length == BruteForce.countTwoStars(g))
      assert(Pattern.ThreeStar.instances(g).length == BruteForce.countThreeStars(g))
      assert(Pattern.C3Star.instances(g).length == BruteForce.countPaws(g))
      assert(Pattern.Diamond.instances(g).length == BruteForce.countDiamonds(g))
    }
  }

  test("pattern instances have the declared number of distinct nodes") {
    Check.forAllGraphs(20, 3, 8) { g =>
      for (p <- Pattern.all; inst <- p.instances(g)) {
        assert(inst.length == p.numNodes && inst.distinct.length == inst.length)
        assert(inst.sorted.sameElements(inst))
      }
    }
  }

  test("groups: multiplicities sum to instance count; triangle has 3 two-stars") {
    val tri = Graph.fromEdges(3, Seq((0, 1), (1, 2), (0, 2)))
    val (sets, counts) = Pattern.groups(Pattern.TwoStar.instances(tri))
    assert(sets.length == 1 && sets(0).sameElements(Array(0, 1, 2)) && counts(0) == 3)
    Check.forAllGraphs(20, 3, 8) { g =>
      for (p <- Pattern.all) {
        val inst = p.instances(g)
        val (_, cnts) = Pattern.groups(inst)
        assert(cnts.sum == inst.length)
      }
    }
  }

  test("pattern degrees sum to |V_psi| * #instances") {
    Check.forAllGraphs(20, 3, 8) { g =>
      for (p <- Pattern.all) {
        val inst = p.instances(g)
        assert(Pattern.degrees(g.n, inst).sum == p.numNodes * inst.length)
      }
    }
  }
}
