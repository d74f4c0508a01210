package repro.data

import org.scalatest.funsuite.AnyFunSuite

class DatasetsSpec extends AnyFunSuite {

  test("karate club topology: 34 nodes, 78 edges, correct degrees") {
    val ug = Datasets.karate()
    assert(ug.n == 34 && ug.m == 78)
    val det = ug.deterministic
    assert(det.degree(33) == 17) // node 34: the Officer hub
    assert(det.degree(0) == 16)  // node 1: Mr. Hi
    assert(det.degree(32) == 12)
  }

  test("karate communities: 16 vs 18 split") {
    val c = Datasets.karateCommunities
    assert(c.length == 34)
    assert(c.count(_ == 0) == 16 && c.count(_ == 1) == 18)
  }

  test("karate probabilities follow 1-exp(-t/20) with Table II-like stats") {
    val ug = Datasets.karate()
    val (mean, std, _) = ug.probStats
    assert(mean > 0.15 && mean < 0.34, s"mean $mean")
    assert(std > 0.03 && std < 0.18, s"std $std")
    assert(ug.prob.forall(p => p > 0.04 && p < 0.7))
  }

  test("dataset stand-ins have the documented scale and probability model") {
    val intel = Datasets.intelLabLike()
    assert(intel.n == 54 && intel.m == 969)
    val (mi, _, _) = intel.probStats
    assert(math.abs(mi - 0.33) < 0.05)

    val lfm = Datasets.lastFmLike()
    assert(lfm.n == 1200 && lfm.m > 3000)
    // Reciprocal-degree rule: every probability is 1/k for integer k.
    assert(lfm.prob.forall(p => math.abs(1.0 / p - math.round(1.0 / p)) < 1e-9))

    val hs = Datasets.homoSapiensLike()
    assert(hs.n == 1200 && hs.m > 15000)
    val (mh, _, _) = hs.probStats
    assert(math.abs(mh - 0.32) < 0.05)

    val bio = Datasets.biomineLike()
    assert(bio.n == 6000 && bio.m > 15000)

    val tw = Datasets.twitterLike()
    assert(tw.n == 8000)
    val (mt, _, _) = tw.probStats
    assert(math.abs(mt - 0.14) < 0.04)

    val fr = Datasets.friendsterLike()
    assert(fr.n == 20000)
    val (mf, _, _) = fr.probStats
    assert(mf < 0.02, s"friendster-like mean prob $mf")
  }

  test("ER and BA generators are deterministic in the seed") {
    val a = Datasets.er(7, 0.5, 1L)
    val b = Datasets.er(7, 0.5, 1L)
    assert(a.m == b.m && a.prob.sameElements(b.prob))
    val c = Datasets.ba(9, 2, 2L)
    val d = Datasets.ba(9, 2, 2L)
    assert(c.m == d.m && c.prob.sameElements(d.prob))
    assert(c.n == 9)
  }
}
