package repro.core

import repro.{Oracle, SparkSpec}
import repro.uncertain.{UncertainGraph, WorldSampler}
import repro.data.Datasets

class MPDSSpec extends SparkSpec {

  private def fig1 = UncertainGraph.fromEdges(4,
    Seq((0, 1, 0.4), (0, 2, 0.4), (1, 3, 0.7)))

  test("sampled tau-hat converges to the exact Table I values") {
    val theta = 4000
    val cands = MPDS.candidateSets(spark, fig1, DensityNotion.Edge, theta, seed = 5L)
    val tau = MPDS.tauHatDF(cands, theta).collect()
      .map(r => r.getString(0) -> r.getDouble(2)).toMap
    def t(s: String) = tau.getOrElse(s, 0.0)
    assert(math.abs(t("1,3") - 0.42) < 0.03)
    assert(math.abs(t("0,2") - 0.24) < 0.03)
    assert(math.abs(t("0,1,2,3") - 0.28) < 0.03)
    assert(math.abs(t("0,1") - 0.072) < 0.02)
  }

  test("top-1 MPDS of the Figure 1 graph is {B,D}") {
    val r = MPDS.run(spark, fig1, DensityNotion.Edge, k = 1, theta = 2000, seed = 7L)
    assert(r.topK.head.nodes == Seq(1, 3))
    assert(math.abs(r.topK.head.tauHat - 0.42) < 0.05)
  }

  test("estimator is unbiased across seeds (mean of estimates ~ tau)") {
    val runs = (0 until 10).map { s =>
      val cands = MPDS.candidateSets(spark, fig1, DensityNotion.Edge, 500, seed = 1000L + s)
      MPDS.tauHatDF(cands, 500).collect()
        .collectFirst { case r if r.getString(0) == "1,3" => r.getDouble(2) }
        .getOrElse(0.0)
    }
    assert(math.abs(runs.sum / runs.size - 0.42) < 0.03)
  }

  test("tauHat aggregation matches DuckDB (oracle)") {
    val theta = 300
    val cands = MPDS.candidateSets(spark, fig1, DensityNotion.Edge, theta, seed = 11L)
    val agg = MPDS.tauHatDF(cands, theta).select("nodeSet", "freq")
    Oracle.assertEquivalent(
      agg,
      "SELECT nodeSet, COUNT(*) AS freq FROM cands GROUP BY nodeSet",
      "cands" -> cands,
    )
  }

  test("worldStats counts densest subgraphs per world (oracle-checked stats)") {
    val theta = 200
    val stats = MPDS.worldStats(spark, fig1, DensityNotion.Edge, theta, seed = 13L)
    assert(stats.count() == theta)
    // Per-world densest count is 0 (empty world), 1, or 3 (world G7).
    val counts = stats.collect().map(_.getLong(1)).toSet
    assert(counts.subsetOf(Set(0L, 1L, 3L)))
    import org.apache.spark.sql.functions._
    val summary = stats.agg(
      sum("numDensest").cast("long").as("total"),
      max("numDensest").cast("long").as("mx"))
    Oracle.assertEquivalent(
      summary,
      "SELECT CAST(SUM(CAST(numDensest AS BIGINT)) AS BIGINT) AS total, " +
        "MAX(CAST(numDensest AS BIGINT)) AS mx FROM stats",
      "stats" -> stats,
    )
  }

  test("all-vs-one: keeping one densest per world underestimates tau") {
    // Use a graph with frequent ties (two disjoint strong edges).
    val ug = UncertainGraph.fromEdges(4, Seq((0, 1, 0.9), (2, 3, 0.9)))
    val theta = 2000
    val all = MPDS.run(spark, ug, DensityNotion.Edge, 3, theta, seed = 17L, allPerWorld = true)
    val one = MPDS.run(spark, ug, DensityNotion.Edge, 3, theta, seed = 17L, allPerWorld = false)
    val tauAll = all.topK.map(c => c.nodes -> c.tauHat).toMap
    val tauOne = one.topK.map(c => c.nodes -> c.tauHat).toMap
    // Both edges tie in ~81% of worlds; with one-per-world each gets ~half.
    val e01 = Seq(0, 1)
    assert(tauAll(e01) > 0.85)
    assert(tauOne.getOrElse(e01, 0.0) < 0.65)
  }

  test("estimateTau scores arbitrary node sets consistently with exact values") {
    val est = MPDS.estimateTau(spark, fig1, DensityNotion.Edge,
      Seq(Set(1, 3), Set(0, 2), Set(0, 1, 2, 3)), theta = 3000, seed = 19L)
    assert(math.abs(est(0) - 0.42) < 0.03)
    assert(math.abs(est(1) - 0.24) < 0.03)
    assert(math.abs(est(2) - 0.28) < 0.03)
  }

  test("estimateGamma matches Example 3") {
    val est = MPDS.estimateGamma(spark, fig1, DensityNotion.Edge,
      Seq(Set(1, 3)), theta = 3000, seed = 23L)
    assert(math.abs(est.head - 0.7) < 0.03)
  }

  test("samplers agree on tau-hat within sampling error") {
    for (s <- WorldSampler.all) {
      val est = MPDS.estimateTau(spark, fig1, DensityNotion.Edge,
        Seq(Set(1, 3)), theta = 2000, sampler = s, seed = 29L)
      assert(math.abs(est.head - 0.42) < 0.04, s"${s.name}: ${est.head}")
    }
  }

  test("heuristic candidates are dense subgraphs (karate smoke test)") {
    val ug = Datasets.karate()
    val r = MPDS.run(spark, ug, DensityNotion.Edge, 3, theta = 50, seed = 31L, heuristic = true)
    assert(r.topK.nonEmpty)
    assert(r.topK.head.nodes.nonEmpty)
  }
}
