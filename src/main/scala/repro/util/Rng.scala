package repro.util

/** Seed mixing for per-element deterministic RNGs.
  *
  * `java.util.Random(seed)` with *sequential* seeds produces correlated
  * first draws (the LCG scrambles the seed only once); generators seed one
  * RNG per element id, so they pass the seed through a full-avalanche
  * mix (splitmix64 finalizer) first.
  */
object Rng {
  @inline def mix(z0: Long): Long = {
    var z = z0 + 0x9e3779b97f4a7c15L
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }
}
