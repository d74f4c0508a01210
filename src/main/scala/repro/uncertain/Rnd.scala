package repro.uncertain

/** Seed mixing for per-world RNG streams. `java.util.Random` instances
  * created from sequential seeds emit correlated first draws, which biases
  * Bernoulli edge sampling across worlds; the splitmix64 finaliser
  * decorrelates (world index, base seed) pairs.
  */
object Rnd {
  def mix(z0: Long): Long = {
    var z = z0 + 0x9E3779B97F4A7C15L
    z = (z ^ (z >>> 30)) * 0xBF58476D1CE4E5B9L
    z = (z ^ (z >>> 27)) * 0x94D049BB133111EBL
    z ^ (z >>> 31)
  }

  def forWorld(seed: Long, world: Long): scala.util.Random =
    new scala.util.Random(mix(seed * 0x9E3779B97F4A7C15L + world))
}
