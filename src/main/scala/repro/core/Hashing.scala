package repro.core

/** Hashing substrate shared by every sketch in this repo.
  *
  * All hash functions are built from a splitmix64-style finalizer over
  * 64-bit inputs, seeded so that distinct logical hash functions (the
  * pair hash `h*`, the geometric rank `ρ*`, CSE/vHLL's per-user
  * selectors `f_i(s)` and item hashes `h(d)`, `ρ(d)`) are mutually
  * independent for all practical purposes. Everything is deterministic
  * in the seed, which the test suites rely on.
  */
object Hashing {

  /** splitmix64 finalizer: a bijective 64-bit mixer with good avalanche. */
  def mix64(x0: Long): Long = {
    var x = x0 + 0x9e3779b97f4a7c15L
    x = (x ^ (x >>> 30)) * 0xbf58476d1ce4e5b9L
    x = (x ^ (x >>> 27)) * 0x94d049bb133111ebL
    x ^ (x >>> 31)
  }

  /** Mix two 64-bit values (e.g. a user id and an item id) into one hash. */
  def mix64(a: Long, b: Long): Long = mix64(mix64(a) ^ (b * 0xff51afd7ed558ccdL))

  /** Mix three 64-bit values (seed, user, function index …). */
  def mix64(a: Long, b: Long, c: Long): Long = mix64(mix64(a, b) ^ mix64(c + 0x2545f4914f6cdd1dL))

  /** Uniform index in `[0, range)` from a 64-bit hash (modulo bias is
    * `range / 2^64`, negligible for every range used here).
    */
  def index(hash: Long, range: Long): Long = java.lang.Math.floorMod(hash, range)

  /** `h*(e)`: uniform position in `[0, m)` for user–item pair (s, d). */
  def pairIndex(s: Long, d: Long, m: Long, seed: Long): Long =
    index(mix64(seed, s, d), m)

  /** Geometric(1/2) rank in {1, 2, …}: `P(ρ = k) = 2^-k`, derived from the
    * leading-zero count of an independent 64-bit hash. Capped at `cap`
    * (the register saturation value, e.g. 31 for 5-bit registers).
    */
  def pairRank(s: Long, d: Long, cap: Int, seed: Long): Int = {
    val h = mix64(seed ^ 0x5851f42d4c957f2dL, s, d)
    math.min(java.lang.Long.numberOfLeadingZeros(h) + 1, cap)
  }

  /** Geometric(1/2) rank of a single value (vHLL/HLL hash items only). */
  def rank(d: Long, cap: Int, seed: Long): Int = {
    val h = mix64(seed ^ 0x5851f42d4c957f2dL, d)
    math.min(java.lang.Long.numberOfLeadingZeros(h) + 1, cap)
  }

  /** `f_i(s)`: the i-th independent user-selector hash of CSE/vHLL,
    * uniform in `[0, range)`.
    */
  def userSelect(s: Long, i: Int, range: Long, seed: Long): Long =
    index(mix64(seed + 0x632be59bd9b4e019L, s, i.toLong), range)

  /** `h(d)`: uniform item hash in `[0, m)` used by LPC/CSE/vHLL/HLL. */
  def itemIndex(d: Long, m: Long, seed: Long): Long =
    index(mix64(seed + 0x9e3779b97f4a7c15L, d), m)
}
