package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core.{DensityNotion, ExactMPDS, MPDS}
import repro.data.Datasets
import repro.graph.Pattern
import repro.uncertain.{Metrics, UncertainGraph}
import Harness._

/** Table XV — running times of the exact algorithm (all 2^m worlds) vs our
  * sampling algorithm on small synthetic BA / ER graphs, for edge,
  * 3-clique and diamond density. Graph sizes are scaled so the exact side
  * stays feasible on this container (m <= ~20, DESIGN.md §4); the paper's
  * claim — an orders-of-magnitude gap growing exponentially with m — is
  * what the shape must reproduce. Also reports the top-k F1 of our method
  * vs the exact one (the §VI-H effectiveness check, Figure 17).
  */
object TableXV {

  def graphs: Seq[(String, UncertainGraph)] = Seq(
    ("BA_7", Datasets.ba(7, 2, seed = 71L)),
    ("BA_9", Datasets.ba(9, 2, seed = 91L)),
    ("ER_7", Datasets.er(7, 0.9, seed = 72L)),
    ("ER_9", Datasets.er(9, 0.67, seed = 92L)),
  )

  def run(spark: SparkSession, theta: Int = 320, k: Int = 5): Table = {
    val notions = Seq[DensityNotion](
      DensityNotion.Edge, DensityNotion.Clique(3), DensityNotion.Pat(Pattern.Diamond))
    // Warm up JIT + Spark stages so the first row's timing is not skewed.
    val warm = Datasets.ba(6, 2, seed = 61L)
    ExactMPDS.topK(spark, warm, DensityNotion.Edge, 1)
    MPDS.run(spark, warm, DensityNotion.Edge, 1, 50, seed = 700L)
    val rows = graphs.map { case (name, g) =>
      val cells = notions.flatMap { notion =>
        val (exact, msE) = time(ExactMPDS.topK(spark, g, notion, k))
        val (approx, msA) = time(MPDS.run(spark, g, notion, k, theta, seed = 701L))
        val f1 = {
          val n = math.min(exact.size, approx.topK.size)
          if (n == 0) 1.0
          else (0 until n).map(i =>
            Metrics.f1(approx.topK(i).nodes.toSet, exact(i).nodes.toSet)).sum / n
        }
        Seq(secs(msE), secs(msA), f3(f1))
      }
      Seq(name, g.m.toString) ++ cells
    }
    Table(s"Table XV: exact vs approximate MPDS running times (s) and avg top-$k F1; theta=$theta",
      Seq("graph", "m",
        "edge Exact", "edge Ours", "edge F1",
        "3cl Exact", "3cl Ours", "3cl F1",
        "dia Exact", "dia Ours", "dia F1"), rows)
  }
}
