package repro.uncertain

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class PoissonBinomialSpec extends AnyFunSuite {

  private def brutePmf(probs: Array[Double]): Array[Double] = {
    val n = probs.length
    val pmf = new Array[Double](n + 1)
    for (mask <- 0 until (1 << n)) {
      var p = 1.0
      var ones = 0
      for (i <- 0 until n) {
        if ((mask & (1 << i)) != 0) { p *= probs(i); ones += 1 }
        else p *= 1 - probs(i)
      }
      pmf(ones) += p
    }
    pmf
  }

  test("pmf matches brute-force enumeration") {
    val rnd = new Random(3)
    for (_ <- 0 until 30) {
      val n = 1 + rnd.nextInt(10)
      val probs = Array.fill(n)(rnd.nextDouble())
      val got = PoissonBinomial.pmf(probs)
      val exp = brutePmf(probs)
      for (j <- 0 to n) assert(math.abs(got(j) - exp(j)) < 1e-12, s"j=$j")
    }
  }

  test("tailGeq matches brute force and is monotone") {
    val rnd = new Random(9)
    for (_ <- 0 until 20) {
      val n = 1 + rnd.nextInt(9)
      val probs = Array.fill(n)(rnd.nextDouble())
      val exp = brutePmf(probs)
      var prev = 2.0
      for (k <- 0 to n + 1) {
        val got = PoissonBinomial.tailGeq(probs, k)
        val want = exp.drop(math.max(0, k)).sum
        assert(math.abs(got - math.min(1.0, want)) < 1e-12)
        assert(got <= prev + 1e-12)
        prev = got
      }
    }
  }

  test("maxKWithTail is the definition's arg max") {
    val rnd = new Random(17)
    for (_ <- 0 until 20) {
      val n = 1 + rnd.nextInt(8)
      val probs = Array.fill(n)(rnd.nextDouble())
      val eta = 0.05 + rnd.nextDouble() * 0.9
      val got = PoissonBinomial.maxKWithTail(probs, eta)
      val brute = (0 to n).filter(k => PoissonBinomial.tailGeq(probs, k) >= eta).maxOption.getOrElse(0)
      assert(got == brute)
    }
  }

  test("degenerate cases") {
    assert(PoissonBinomial.tailGeq(Array.empty, 0) == 1.0)
    assert(PoissonBinomial.tailGeq(Array.empty, 1) == 0.0)
    assert(PoissonBinomial.tailGeq(Array(1.0, 1.0), 2) == 1.0)
  }
}
