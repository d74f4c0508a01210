package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.data.Datasets
import repro.graph.Pattern
import repro.uncertain.WorldSampler

/** Invariant checks of the per-world subroutine on realistic worlds:
  * every enumerated densest subgraph must achieve exactly the optimum
  * density, the maximum-sized densest subgraph must be their union, and
  * no subgraph may be enumerated twice — across sampled Karate worlds and
  * all density notions. These run on real (sampled) topologies rather than
  * the tiny random graphs of the brute-force suites.
  */
class WorldInvariantsSpec extends AnyFunSuite {

  private val ug = Datasets.karate()
  private val notions = Seq[DensityNotion](
    DensityNotion.Edge, DensityNotion.Clique(3), DensityNotion.Clique(4),
    DensityNotion.Pat(Pattern.TwoStar), DensityNotion.Pat(Pattern.ThreeStar),
    DensityNotion.Pat(Pattern.C3Star), DensityNotion.Pat(Pattern.Diamond))

  for (w <- 0 until 3; notion <- notions) {
    test(s"world $w, ${notion.name}: densest family invariants hold") {
      val world = ug.world(WorldSampler.MonteCarlo.worldForIndex(ug, w, 3, seed = 77L))
      val r = notion.allDensest(world, 100000)
      assert(!r.capped)
      // Every enumerated set achieves exactly the optimal density.
      for (s <- r.all) {
        val (num, den) = notion.densityOf(world, s.toSet)
        assert(num * r.den == r.num * den, s"set ${s.mkString(",")}")
      }
      // No duplicates; maxSized is the union.
      assert(r.all.map(_.toSeq).distinct.size == r.all.size)
      assert(r.maxSized.toSet == r.all.flatten.toSet)
      if (r.all.nonEmpty) {
        // The union is itself densest ([58]).
        val (num, den) = notion.densityOf(world, r.maxSized.toSet)
        assert(num * r.den == r.num * den, "union must be densest")
      }
    }
  }

  test("deterministic karate densest subgraph is stable") {
    val det = ug.deterministic
    val r = DensityNotion.Edge.allDensest(det, 1000)
    assert(r.all.nonEmpty && !r.capped)
    assert(r.num.toDouble / r.den > 1.0, "karate's densest subgraph is denser than a tree")
  }
}
