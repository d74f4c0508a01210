package repro.core

import repro.graph._

/** A density notion ρ (§II-A) together with the per-world subroutines
  * Algorithm 1/5 need: enumerate all densest subgraphs, the maximum-sized
  * densest subgraph, the optimal density, and the density of a given node
  * set — plus the §III-C heuristic substitute.
  */
sealed trait DensityNotion extends Serializable {
  def name: String

  /** Instance node sets under this notion (edges / h-cliques / ψ-instances). */
  def instances(g: Graph): Array[Array[Int]]

  /** All densest subgraphs + maximum-sized one + exact optimum density. */
  def allDensest(g: Graph, cap: Int): DensityNotion.World

  /** Density of `nodes` inside world `g`, as an exact rational. */
  final def densityOf(g: Graph, nodes: Set[Int]): (Long, Long) = {
    if (nodes.isEmpty) return (0L, 1L)
    val cnt = instances(g).count(_.forall(nodes.contains)).toLong
    (cnt, nodes.size.toLong)
  }

  /** §III-C heuristic: reasonably dense subgraphs from core decomposition
    * (the innermost core and all denser peel suffixes).
    */
  final def heuristicDense(g: Graph): Seq[Array[Int]] = {
    val inst = instances(g)
    if (inst.isEmpty) return Seq.empty
    val pr = HyperPeeling.peel(g.n, inst)
    pr.heuristicDenseSubgraphs.map(mask => (0 until g.n).filter(mask(_)).toArray)
  }
}

object DensityNotion {

  /** Per-world result: the densest family (possibly capped), its union, and
    * the optimum density ρ* as a reduced rational.
    */
  final case class World(
      all: Seq[Array[Int]],
      capped: Boolean,
      maxSized: Array[Int],
      num: Long,
      den: Long,
  )

  case object Edge extends DensityNotion {
    val name = "edge"
    def instances(g: Graph): Array[Array[Int]] =
      Array.tabulate(g.m)(i => Array(g.edgeU(i), g.edgeV(i)))
    def allDensest(g: Graph, cap: Int): World = {
      val r = EdgeDensest.allDensest(g, cap)
      World(r.all, r.capped, r.maxSized, r.densityNum, r.densityDen)
    }
  }

  final case class Clique(h: Int) extends DensityNotion {
    val name = s"$h-clique"
    def instances(g: Graph): Array[Array[Int]] = Cliques.enumerate(g, h)
    def allDensest(g: Graph, cap: Int): World = {
      val r = CliqueDensest.allDensest(g, h, cap)
      World(r.all, r.capped, r.maxSized, r.densityNum, r.densityDen)
    }
  }

  final case class Pat(psi: Pattern) extends DensityNotion {
    val name = psi.name
    def instances(g: Graph): Array[Array[Int]] = psi.instances(g)
    def allDensest(g: Graph, cap: Int): World = {
      val r = PatternDensest.allDensest(g, psi, cap)
      World(r.all, r.capped, r.maxSized, r.densityNum, r.densityDen)
    }
  }
}
