package repro.core

import scala.util.Random

/** Seed hygiene: `java.util.Random` (behind `scala.util.Random`) is a linear
  * congruential generator whose streams are strongly correlated across
  * *sequential* seeds — exactly the pattern Monte Carlo harnesses produce
  * (`seedBase + rep`). Every RNG in this codebase is therefore constructed
  * through a splitmix64 finalizer so neighbouring seeds give independent
  * streams.
  */
object Rng {

  /** splitmix64 finalizer — bijective, avalanching. */
  def scramble(seed: Long): Long = {
    var z = seed + 0x9e3779b97f4a7c15L
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }

  /** A Random whose stream is decorrelated from neighbouring seeds. */
  def apply(seed: Long): Random = new Random(scramble(seed))
}
