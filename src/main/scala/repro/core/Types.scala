package repro.core

/** A HC-s-t path enumeration query `q(s, t, k)` (Section II): enumerate all
  * simple paths from `s` to `t` with at most `k` hops.
  */
final case class PathQuery(qid: Int, s: Long, t: Long, k: Int) {
  require(k >= 1, s"hop constraint must be >= 1, got $k")
  require(s != t, s"s == t == $s: HC-s-t path queries assume distinct endpoints")

  /** Default bidirectional split of Section III: forward budget. */
  def fwdBudget: Int = (k + 1) / 2

  /** Default bidirectional split of Section III: backward budget. */
  def bwdBudget: Int = k / 2
}

/** Per-phase wall-clock decomposition of a batch run (Exp-3, Fig. 9). */
final case class PhaseTimings(
    buildIndexMs: Long,
    clusterQueryMs: Long,
    identifySubqueryMs: Long,
    enumerationMs: Long,
) {
  def totalMs: Long = buildIndexMs + clusterQueryMs + identifySubqueryMs + enumerationMs
}
