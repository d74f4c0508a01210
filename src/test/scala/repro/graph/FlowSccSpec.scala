package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class FlowSccSpec extends AnyFunSuite {

  test("max flow on a classic small network") {
    // CLRS-style: s=0, t=5.
    val net = new FlowNetwork(6)
    net.addArc(0, 1, 16); net.addArc(0, 2, 13)
    net.addArc(1, 3, 12); net.addArc(2, 1, 4)
    net.addArc(3, 2, 9); net.addArc(2, 4, 14)
    net.addArc(4, 3, 7); net.addArc(3, 5, 20)
    net.addArc(4, 5, 4)
    assert(net.maxFlow(0, 5) == 23L)
    val cut = net.minCutSourceSide(0)
    assert(cut(0) && !cut(5))
  }

  test("max flow equals brute-force min cut on random networks") {
    val rnd = new Random(7)
    for (_ <- 0 until 40) {
      val n = 4 + rnd.nextInt(4)
      val arcs = for {
        u <- 0 until n; v <- 0 until n
        if u != v && rnd.nextDouble() < 0.45
      } yield (u, v, 1L + rnd.nextInt(10).toLong)
      val net = new FlowNetwork(n)
      arcs.foreach { case (u, v, c) => net.addArc(u, v, c) }
      val s = 0; val t = n - 1
      val flow = net.maxFlow(s, t)
      // Brute-force min cut over all node bipartitions with s in S, t out.
      var best = Long.MaxValue
      for (mask <- 0 until (1 << n); if (mask & 1) == 1 && (mask & (1 << t)) == 0) {
        val inS = (v: Int) => (mask & (1 << v)) != 0
        val cut = arcs.collect { case (u, v, c) if inS(u) && !inS(v) => c }.sum
        best = math.min(best, cut)
      }
      assert(flow == best, s"flow $flow != min cut $best")
    }
  }

  test("minCutSourceSide is a minimum cut witness") {
    val rnd = new Random(13)
    for (_ <- 0 until 30) {
      val n = 4 + rnd.nextInt(4)
      val arcs = for {
        u <- 0 until n; v <- 0 until n
        if u != v && rnd.nextDouble() < 0.4
      } yield (u, v, 1L + rnd.nextInt(5).toLong)
      val net = new FlowNetwork(n)
      arcs.foreach { case (u, v, c) => net.addArc(u, v, c) }
      val flow = net.maxFlow(0, n - 1)
      val side = net.minCutSourceSide(0)
      assert(side(0) && !side(n - 1))
      val cutVal = arcs.collect { case (u, v, c) if side(u) && !side(v) => c }.sum
      assert(cutVal == flow)
    }
  }

  test("SCC matches brute-force mutual reachability") {
    val rnd = new Random(21)
    for (_ <- 0 until 40) {
      val n = 2 + rnd.nextInt(7)
      val adj = Array.tabulate(n)(u =>
        (0 until n).filter(v => v != u && rnd.nextDouble() < 0.3).toArray)
      val (comp, _) = SCC.components(adj)
      val reach = Array.fill(n, n)(false)
      for (u <- 0 until n) {
        val seen = Array.fill(n)(false)
        def dfs(x: Int): Unit = { seen(x) = true; adj(x).foreach(y => if (!seen(y)) dfs(y)) }
        dfs(u)
        for (v <- 0 until n) reach(u)(v) = seen(v)
      }
      for (u <- 0 until n; v <- 0 until n)
        assert((comp(u) == comp(v)) == (reach(u)(v) && reach(v)(u)))
    }
  }

  test("SCC component ids are reverse-topological") {
    val rnd = new Random(33)
    for (_ <- 0 until 30) {
      val n = 3 + rnd.nextInt(6)
      val adj = Array.tabulate(n)(u =>
        (0 until n).filter(v => v != u && rnd.nextDouble() < 0.3).toArray)
      val (comp, _) = SCC.components(adj)
      for (u <- 0 until n; v <- adj(u); if comp(u) != comp(v))
        assert(comp(u) > comp(v), "arcs must go from higher to lower component id")
    }
  }

  test("descendants closure is transitive and complete") {
    val dag = Array(Array.empty[Int], Array(0), Array(1), Array(1, 0))
    val des = SCC.descendants(dag)
    assert(des(0).isEmpty)
    assert(des(1).get(0) && des(1).cardinality == 1)
    assert(des(2).get(0) && des(2).get(1) && des(2).cardinality == 2)
    assert(des(3).get(0) && des(3).get(1) && des(3).cardinality == 2)
  }
}
