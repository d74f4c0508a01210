package repro.exp

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._
import repro.core.{DensityNotion, MPDS}
import repro.data.Datasets
import repro.graph.Pattern
import repro.uncertain.{EDS, Metrics, UncertainCore, UncertainTruss}
import Harness._

/** Table VIII — distribution (mean, std, quartiles) of the number of
  * densest subgraphs per sampled world (edge / 3-clique / diamond).
  * Enumeration is capped per world (DESIGN.md): the quartiles are exact
  * whenever below the cap; the mean is a lower bound on heavy-tailed
  * datasets (which is the paper's very observation about LastFM).
  */
object TableVIII {
  val Cap = 4096

  def run(spark: SparkSession): Table = {
    val datasets = Seq(
      ("KarateClub", Datasets.karate(), 320),
      ("LastFM-like", Datasets.lastFmLike(), 160),
    )
    val notions = Seq(
      DensityNotion.Edge, DensityNotion.Clique(3), DensityNotion.Pat(Pattern.Diamond))
    val rows = for ((name, g, theta) <- datasets; notion <- notions) yield {
      val stats = MPDS.worldStats(spark, g, notion, theta, seed = 401L, capPerWorld = Cap)
      val agg = stats.agg(
        avg("numDensest").as("mean"),
        stddev_pop("numDensest").as("std"),
        expr("percentile(numDensest, 0.25)").as("q1"),
        expr("percentile(numDensest, 0.5)").as("q2"),
        expr("percentile(numDensest, 0.75)").as("q3"),
      ).collect().head
      Seq(name, notion.name, f(agg.getDouble(0)), f(agg.getDouble(1)),
        s"{${agg.getDouble(2).toLong}, ${agg.getDouble(3).toLong}, ${agg.getDouble(4).toLong}}")
    }
    Table(s"Table VIII: #densest subgraphs per sampled world (cap $Cap)",
      Seq("dataset", "notion", "mean", "std", "quartiles"), rows)
  }
}

/** Table IX — average estimated DSP of the top-10 MPDSs when every densest
  * subgraph per world is counted vs only one randomly chosen one.
  */
object TableIX {
  def run(spark: SparkSession): Table = {
    val datasets = Seq(
      ("KarateClub", Datasets.karate(), 320),
      ("LastFM-like", Datasets.lastFmLike(), 160),
    )
    val notions = Seq(
      DensityNotion.Edge, DensityNotion.Clique(3), DensityNotion.Pat(Pattern.Diamond))
    val rows = for ((name, g, theta) <- datasets) yield {
      val cells = notions.flatMap { notion =>
        def avgTop10(allPerWorld: Boolean): Double = {
          val r = MPDS.run(spark, g, notion, k = 10, theta = theta, seed = 403L,
            allPerWorld = allPerWorld, capPerWorld = TableVIII.Cap)
          if (r.topK.isEmpty) 0.0 else r.topK.map(_.tauHat).sum / r.topK.size
        }
        Seq(f(avgTop10(true)), f(avgTop10(false)))
      }
      name +: cells
    }
    Table("Table IX: avg DSP of top-10 MPDSs, all vs one densest per world",
      Seq("dataset", "edge All", "edge One", "3-clique All", "3-clique One",
        "diamond All", "diamond One"), rows)
  }
}

/** Table X — purity of the top-k node sets (Karate Club, ground-truth
  * factions): MPDS top-k vs EDS-style ranking, η-cores and γ-trusses (the
  * last two have only two distinct levels on Karate, as in the paper).
  */
object TableX {
  def run(spark: SparkSession): Table = {
    val g = Datasets.karate()
    val comm = Datasets.karateCommunities
    val theta = 320
    val mpds = MPDS.run(spark, g, DensityNotion.Edge, k = 10, theta = theta, seed = 405L)
    val mpdsSets = mpds.topK.map(_.nodes.toSet)

    // EDS "top-k": distinct peel suffixes of the expected graph ranked by
    // expected density (documented stand-in for a top-k expected-densest
    // enumeration, which [44] does not define).
    val pr = repro.graph.HyperPeeling.peel(g.n,
      Array.tabulate(g.m)(i => Array(g.edgeU(i), g.edgeV(i))))
    val edsRanked = (0 until g.n).map { start =>
      (start until g.n).map(pr.order).toSet
    }.distinct
      .filter(_.nonEmpty)
      .sortBy(s => -EDS.expectedEdgeDensity(g, s))
      .take(10)

    // Cores / trusses: distinct levels, innermost first.
    val core = UncertainCore.coreNumbers(g, Baselines.Eta)
    val coreLevels = core.distinct.sorted.reverse.toSeq
      .map(k => (0 until g.n).filter(core(_) >= k).toSet).filter(_.nonEmpty)
    val truss = UncertainTruss.trussNumbers(g, Baselines.Gamma)
    val trussLevels = truss.distinct.sorted.reverse.toSeq
      .map(k => (0 until g.m).filter(truss(_) >= k)
        .flatMap(e => Seq(g.edgeU(e), g.edgeV(e))).toSet).filter(_.nonEmpty)

    def avgPurity(sets: Seq[Set[Int]], k: Int): String =
      if (sets.size < k) "-"
      else f3(sets.take(k).map(Metrics.purity(_, comm)).sum / k)

    val rows = Seq(1, 2, 5, 10).map { k =>
      Seq(k.toString, avgPurity(mpdsSets, k), avgPurity(edsRanked, k),
        avgPurity(coreLevels, k), avgPurity(trussLevels, k))
    }
    Table("Table X: purity of top-k node sets (Karate Club)",
      Seq("top-k", "MPDS", "EDS", "Core", "Truss"), rows)
  }
}
