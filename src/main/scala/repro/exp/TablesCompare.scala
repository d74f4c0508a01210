package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core.{DDS, DensityNotion, MPDS, NDS}
import repro.data.Datasets
import repro.uncertain._
import Harness._

/** Shared machinery for the baseline-comparison tables (III–VII): compute
  * our subgraph (MPDS for small datasets, NDS for large ones) and the three
  * baselines (EDS [44], innermost (k,η)-core [40], innermost (k,γ)-truss
  * [41]), then score them under the relevant metric.
  */
object Baselines {
  val Eta = 0.1
  val Gamma = 0.1

  final case class Computed(
      name: String,
      g: UncertainGraph,
      ours: Set[Int],     // MPDS or NDS node set
      oursTauHat: Double, // MPDS only; NaN for NDS
      eds: Set[Int],
      core: Set[Int],
      truss: Set[Int],
  )

  def mpdsSets(spark: SparkSession, name: String, g: UncertainGraph, theta: Int,
      cap: Int = 4096, seed: Long = 301L): Computed = {
    val r = MPDS.run(spark, g, DensityNotion.Edge, k = 1, theta = theta,
      seed = seed, capPerWorld = cap)
    val ours = r.topK.headOption.map(_.nodes.toSet).getOrElse(Set.empty)
    val tau = r.topK.headOption.map(_.tauHat).getOrElse(0.0)
    Computed(name, g, ours, tau, EDS.edge(g).nodes,
      UncertainCore.innermostCore(g, Eta), UncertainTruss.innermostTruss(g, Gamma))
  }

  /** `lm` defaults to 8 on the large datasets: Problem 3's minimum-size
    * constraint exists precisely so the nucleus is a community-scale set
    * rather than a 2-node core (the paper sweeps l_m up to 750).
    */
  def ndsSets(spark: SparkSession, name: String, g: UncertainGraph, theta: Int,
      seed: Long = 303L, lm: Int = 8): Computed = {
    val r = NDS.run(spark, g, DensityNotion.Edge, k = 1, lm = lm, theta = theta, seed = seed)
    val ours = r.topK.headOption.map(_.nodes.toSet).getOrElse(Set.empty)
    Computed(name, g, ours, Double.NaN, EDS.edge(g).nodes,
      UncertainCore.innermostCore(g, Eta), UncertainTruss.innermostTruss(g, Gamma))
  }
}

/** Table III — densest subgraph containment probabilities of NDS vs EDS,
  * innermost η-core, innermost γ-truss on the large datasets, plus the
  * expected densities of NDS and EDS.
  */
object TableIII {
  def run(spark: SparkSession, theta: Int = 160): Table = {
    val datasets = Seq(
      ("HomoSapiens-like", Datasets.homoSapiensLike()),
      ("Biomine-like", Datasets.biomineLike()),
      ("Twitter-like", Datasets.twitterLike()),
    )
    val rows = datasets.map { case (name, g) =>
      val c = Baselines.ndsSets(spark, name, g, theta)
      val gammas = MPDS.estimateGamma(spark, g, DensityNotion.Edge,
        Seq(c.ours, c.eds, c.core, c.truss), theta, seed = 901L)
      Seq(name, f3(gammas(0)), f3(gammas(1)), f3(gammas(2)), f3(gammas(3)),
        f3(EDS.expectedEdgeDensity(g, c.ours)), f3(EDS.expectedEdgeDensity(g, c.eds)))
    }
    Table(s"Table III: containment probability (NDS/EDS/core/truss) and expected density; theta=$theta",
      Seq("dataset", "NDS", "EDS", "Core", "Truss", "ExpDens NDS", "ExpDens EDS"), rows)
  }
}

/** Table IV — densest subgraph probabilities of MPDS vs EDS, core, truss on
  * the small datasets, plus expected densities of MPDS and EDS.
  */
object TableIV {
  def run(spark: SparkSession): Table = {
    val datasets = Seq(
      ("KarateClub", Datasets.karate(), 320),
      ("IntelLab-like", Datasets.intelLabLike(), 160),
      ("LastFM-like", Datasets.lastFmLike(), 320),
    )
    val rows = datasets.map { case (name, g, theta) =>
      val c = Baselines.mpdsSets(spark, name, g, theta)
      // Score every node set (incl. the MPDS) on the same held-out sample,
      // so identical sets receive identical estimates.
      val taus = MPDS.estimateTau(spark, g, DensityNotion.Edge,
        Seq(c.ours, c.eds, c.core, c.truss), theta, seed = 903L)
      Seq(name, f3(taus(0)), f3(taus(1)), f3(taus(2)), f3(taus(3)),
        f3(EDS.expectedEdgeDensity(g, c.ours)), f3(EDS.expectedEdgeDensity(g, c.eds)))
    }
    Table("Table IV: densest subgraph probability (MPDS/EDS/core/truss) and expected density",
      Seq("dataset", "MPDS", "EDS", "Core", "Truss", "ExpDens MPDS", "ExpDens EDS"), rows)
  }
}

/** Tables V and VI — probabilistic density (Eq 19) and probabilistic
  * clustering coefficient (Eq 20) of our subgraph vs the baselines
  * (MPDS for the two smaller datasets, NDS for the two larger).
  */
object TablesVVI {
  def run(spark: SparkSession): (Table, Table) = {
    val computed = Seq(
      Baselines.mpdsSets(spark, "KarateClub", Datasets.karate(), 320),
      Baselines.mpdsSets(spark, "LastFM-like", Datasets.lastFmLike(), 320),
      Baselines.ndsSets(spark, "Biomine-like", Datasets.biomineLike(), 160),
      Baselines.ndsSets(spark, "Twitter-like", Datasets.twitterLike(), 160),
    )
    def rowsBy(metric: (UncertainGraph, Set[Int]) => Double) = computed.map { c =>
      Seq(c.name, f3(metric(c.g, c.ours)), f3(metric(c.g, c.eds)),
        f3(metric(c.g, c.core)), f3(metric(c.g, c.truss)))
    }
    val header = Seq("dataset", "MPDS/NDS", "EDS", "Core", "Truss")
    (Table("Table V: probabilistic density", header, rowsBy(Metrics.probabilisticDensity)),
      Table("Table VI: probabilistic clustering coefficient", header,
        rowsBy(Metrics.probabilisticClusteringCoefficient)))
  }
}

/** Table VII — densest subgraph probabilities of the MPDS vs the densest
  * subgraph of the deterministic version (DDS).
  */
object TableVII {
  def run(spark: SparkSession): Table = {
    val datasets = Seq(
      ("KarateClub", Datasets.karate(), 320),
      ("IntelLab-like", Datasets.intelLabLike(), 160),
      ("LastFM-like", Datasets.lastFmLike(), 320),
    )
    val rows = datasets.map { case (name, g, theta) =>
      val r = MPDS.run(spark, g, DensityNotion.Edge, k = 1, theta = theta,
        seed = 305L, capPerWorld = 4096)
      val mpdsSet = r.topK.headOption.map(_.nodes.toSet).getOrElse(Set.empty[Int])
      val dds = DDS.nodes(g, DensityNotion.Edge)
      // Same held-out sample for both sets (ties stay ties).
      val taus = MPDS.estimateTau(spark, g, DensityNotion.Edge, Seq(mpdsSet, dds), theta, seed = 905L)
      Seq(name, f3(taus(0)), f3(taus(1)))
    }
    Table("Table VII: densest subgraph probability of MPDS vs deterministic densest subgraph",
      Seq("dataset", "MPDS", "DDS"), rows)
  }
}
