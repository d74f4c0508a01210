package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core.{DensityNotion, MPDS, NDS}
import repro.data.Datasets
import repro.graph.Pattern
import Harness._

/** Table XI — approximate vs heuristic Pattern-NDS on Karate Club:
  * containment probability of the top nucleus and running time, for the
  * four patterns.
  */
object TableXI {
  def run(spark: SparkSession, theta: Int = 320): Table = {
    val g = Datasets.karate()
    val rows = Pattern.all.map { psi =>
      val notion = DensityNotion.Pat(psi)
      def once(heuristic: Boolean): (Double, Long) = {
        val (r, ms) = time(NDS.run(spark, g, notion, k = 1, lm = 2, theta = theta,
          seed = 501L, heuristic = heuristic))
        val gamma = r.topK.headOption.map { top =>
          MPDS.estimateGamma(spark, g, notion, Seq(top.nodes.toSet), theta, seed = 907L).head
        }.getOrElse(0.0)
        (gamma, ms)
      }
      val (ga, ta) = once(heuristic = false)
      val (gh, th) = once(heuristic = true)
      Seq(psi.name, f3(ga), f3(gh), secs(ta), secs(th))
    }
    Table(s"Table XI: approximate vs heuristic Pattern-NDS (Karate Club, theta=$theta)",
      Seq("pattern", "Approx gamma", "Heuristic gamma", "Approx s", "Heuristic s"), rows)
  }
}

/** Table XII — approximate vs heuristic Edge-NDS on the Friendster-like
  * dataset (the very-low-probability regime where the paper switches to the
  * heuristic for its largest graph).
  */
object TableXII {
  def run(spark: SparkSession, theta: Int = 64): Table = {
    val g = Datasets.friendsterLike()
    val notion = DensityNotion.Edge
    def once(heuristic: Boolean): (Double, Long) = {
      val (r, ms) = time(NDS.run(spark, g, notion, k = 1, lm = 2, theta = theta,
        seed = 503L, heuristic = heuristic))
      val gamma = r.topK.headOption.map { top =>
        MPDS.estimateGamma(spark, g, notion, Seq(top.nodes.toSet), theta, seed = 909L).head
      }.getOrElse(0.0)
      (gamma, ms)
    }
    val (ga, ta) = once(heuristic = false)
    val (gh, th) = once(heuristic = true)
    Table(s"Table XII: approximate vs heuristic Edge-NDS (Friendster-like, theta=$theta)",
      Seq("method", "Containment prob", "Running time s"),
      Seq(Seq("Approximate", f3(ga), secs(ta)), Seq("Heuristic", f3(gh), secs(th))))
  }
}
