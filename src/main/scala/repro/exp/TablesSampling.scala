package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core.{DensityNotion, MPDS, NDS}
import repro.data.Datasets
import repro.uncertain.{Metrics, WorldSampler}
import Harness._

/** Tables XIII / XIV — sampling-strategy comparison (MC vs LP vs RSS):
  * sample size θ at convergence, running time at that θ, and the
  * strategy's auxiliary memory. Convergence follows §VI-I: double θ until
  * the returned top-k node sets stabilise w.r.t. the previous θ (average
  * F1 >= 0.9), as the paper does in Figure 19.
  */
object SamplingTables {

  private def avgF1(a: Seq[Set[Int]], b: Seq[Set[Int]]): Double = {
    if (a.isEmpty || b.isEmpty) return 0.0
    val n = math.min(a.size, b.size)
    (0 until n).map(i => Metrics.f1(a(i), b(i))).sum / n
  }

  /** Ladder θ = 10·2^j until the top-k sets stabilise on two consecutive
    * doublings (avg F1 >= 0.98, the plateau criterion of Figure 19);
    * returns (θ, ms at θ).
    */
  private def converge(topAt: Int => Seq[Set[Int]], maxTheta: Int): (Int, Long) = {
    var theta = 10
    var prev = topAt(theta)
    var stableRuns = 0
    var result = maxTheta
    var done = false
    while (!done && theta < maxTheta) {
      theta *= 2
      val cur = topAt(theta)
      stableRuns = if (avgF1(prev, cur) >= 0.98) stableRuns + 1 else 0
      if (stableRuns >= 2) { done = true; result = theta }
      prev = cur
    }
    val (_, ms) = time(topAt(result))
    (result, ms)
  }

  def tableXIII(spark: SparkSession): Table = {
    val g = Datasets.intelLabLike()
    val rows = WorldSampler.all.map { s =>
      val (theta, ms) = converge(t =>
        MPDS.run(spark, g, DensityNotion.Edge, k = 10, theta = t, sampler = s, seed = 601L)
          .topK.map(_.nodes.toSet), maxTheta = 640)
      Seq(s.name, theta.toString, secs(ms), (s.auxiliaryBytes(g, theta) / 1024.0).toString)
    }
    Table("Table XIII: sampling strategies, MPDS on IntelLab-like",
      Seq("method", "theta", "time s", "aux KB"), rows)
  }

  def tableXIV(spark: SparkSession): Table = {
    val g = Datasets.biomineLike()
    val rows = WorldSampler.all.map { s =>
      val (theta, ms) = converge(t =>
        NDS.run(spark, g, DensityNotion.Edge, k = 10, lm = 2, theta = t, sampler = s, seed = 603L)
          .topK.map(_.nodes.toSet), maxTheta = 640)
      Seq(s.name, theta.toString, secs(ms), (s.auxiliaryBytes(g, theta) / 1024.0).toString)
    }
    Table("Table XIV: sampling strategies, NDS on Biomine-like",
      Seq("method", "theta", "time s", "aux KB"), rows)
  }
}
