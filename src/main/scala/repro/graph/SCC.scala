package repro.graph

import scala.collection.mutable

/** Tarjan's strongly connected components (iterative), plus the condensation
  * DAG with descendant/ancestor closures — the machinery Line 7 of
  * Algorithms 2/4 and the enumeration of Algorithm 3 operate on.
  */
object SCC {

  /** Component id per node (ids are in reverse topological order of the
    * condensation: every arc goes from a higher id to a lower id).
    */
  def components(adj: Array[Array[Int]]): (Array[Int], Int) = {
    val n = adj.length
    val index = Array.fill(n)(-1)
    val low = new Array[Int](n)
    val onStack = new Array[Boolean](n)
    val comp = Array.fill(n)(-1)
    val stack = mutable.ArrayDeque.empty[Int]
    var nextIndex = 0
    var nComp = 0

    // Explicit DFS stack of (node, childPointer).
    val dfsNode = mutable.ArrayDeque.empty[Int]
    val dfsPtr = mutable.ArrayDeque.empty[Int]

    var root = 0
    while (root < n) {
      if (index(root) < 0) {
        dfsNode.append(root); dfsPtr.append(0)
        index(root) = nextIndex; low(root) = nextIndex; nextIndex += 1
        stack.append(root); onStack(root) = true
        while (dfsNode.nonEmpty) {
          val u = dfsNode.last
          val p = dfsPtr.last
          if (p < adj(u).length) {
            dfsPtr(dfsPtr.length - 1) = p + 1
            val v = adj(u)(p)
            if (index(v) < 0) {
              index(v) = nextIndex; low(v) = nextIndex; nextIndex += 1
              stack.append(v); onStack(v) = true
              dfsNode.append(v); dfsPtr.append(0)
            } else if (onStack(v)) {
              if (index(v) < low(u)) low(u) = index(v)
            }
          } else {
            dfsNode.removeLast(); dfsPtr.removeLast()
            if (dfsNode.nonEmpty) {
              val parent = dfsNode.last
              if (low(u) < low(parent)) low(parent) = low(u)
            }
            if (low(u) == index(u)) {
              var done = false
              while (!done) {
                val w = stack.removeLast()
                onStack(w) = false
                comp(w) = nComp
                if (w == u) done = true
              }
              nComp += 1
            }
          }
        }
      }
      root += 1
    }
    (comp, nComp)
  }

  /** Condensation DAG adjacency (deduplicated, no self-loops). */
  def condensation(adj: Array[Array[Int]], comp: Array[Int], nComp: Int): Array[Array[Int]] = {
    val out = Array.fill(nComp)(mutable.HashSet.empty[Int])
    for (u <- adj.indices; v <- adj(u); if comp(u) != comp(v)) out(comp(u)) += comp(v)
    out.map(_.toArray)
  }

  /** For each component, the set of components reachable from it (strict
    * descendants, excluding itself), as bitsets over component ids.
    */
  def descendants(dag: Array[Array[Int]]): Array[java.util.BitSet] = {
    val nC = dag.length
    val des = Array.fill(nC)(new java.util.BitSet(nC))
    // Tarjan component ids are reverse-topological: arcs go high -> low id,
    // so process components in increasing id order (children first).
    for (c <- 0 until nC; d <- dag(c)) {
      des(c).set(d)
      des(c).or(des(d))
    }
    des
  }
}
