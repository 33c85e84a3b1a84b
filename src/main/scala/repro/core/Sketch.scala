package repro.core

/** Common interface of every user-cardinality sketch in this repo.
  *
  * Semantics follow §V-B of the paper: `update(s, d)` processes one edge of
  * the graph stream (duplicates allowed) and refreshes the arriving user's
  * tracked cardinality counter; `estimate(s)` reads that counter — i.e. for
  * the O(m) baselines it returns the estimate computed at `s`'s most recent
  * arrival, not a freshly recomputed one.
  */
trait UserCardinalitySketch {

  /** Short method name as used in the paper's tables ("FreeBS", "vHLL", …). */
  def name: String

  /** Process edge (user, item); updates the user's tracked counter. */
  def update(s: Long, d: Long): Unit

  /** Tracked cardinality estimate of user `s` (0 if never seen). */
  def estimate(s: Long): Double

  /** Sketch memory in bits, excluding the per-user counters that every
    * method needs alike (the paper excludes them from comparisons too).
    */
  def memoryBits: Long
}
