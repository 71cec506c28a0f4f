package repro.core

/** A 1-1 partial matching between V1 and V2: the set of output 2-clusters.
  *
  * Pairs are (V1 id, V2 id). Singular clusters are implicit (every node
  * not appearing in `pairs`); the paper's effectiveness measures only
  * look at 2-clusters, so they are not materialized.
  */
final case class MatchResult(pairs: Array[(Int, Int)]) {

  /** Pairs as a set for evaluation / comparison. */
  lazy val pairSet: Set[(Int, Int)] = pairs.toSet

  /** Validity: each V1 node and each V2 node appears in at most one pair
    * (the unique mapping constraint of CCER).
    */
  def isValidMatching: Boolean =
    pairs.map(_._1).distinct.length == pairs.length &&
      pairs.map(_._2).distinct.length == pairs.length
}

/** A bipartite graph matching algorithm (paper §3).
  *
  * Implementations are pure, deterministic functions of the graph and the
  * similarity threshold `t`. Stochastic algorithms (BAH) derive their RNG
  * seed from the inputs so repeated calls agree.
  */
trait Matcher {

  /** Short code used throughout the paper (CNC, RSR, …). */
  def code: String

  /** Human-readable name. */
  def name: String

  /** Configuration parameters beyond the similarity threshold (Table 1). */
  def extraConfig: String = "none"

  /** Run the algorithm over `g` with similarity threshold `t`. */
  def run(g: SimGraph, t: Double): MatchResult

  /** Threshold-sweep hook: returns a function usable for many `t` values
    * over the same graph. The default just closes over `run`; algorithms
    * whose solution is threshold-independent up to a final filter (RCA)
    * override this to share the expensive part across the sweep.
    */
  def prepare(g: SimGraph): Double => MatchResult = t => run(g, t)
}

/** Registry of the paper's eight algorithms, in Table 1 / Table 4 order. */
object Matchers {
  val cnc = new Cnc
  val rsr = new Rsr
  val rca = new Rca
  val bah = new Bah()
  val bmc = new Bmc
  val exc = new Exc
  val krc = new Krc
  val umc = new Umc

  /** All eight, in the paper's presentation order. */
  val all: Seq[Matcher] = Seq(cnc, rsr, rca, bah, bmc, exc, krc, umc)

  /** Lookup by code (case-insensitive). */
  def byCode(code: String): Matcher =
    all.find(_.code.equalsIgnoreCase(code)).getOrElse(
      throw new IllegalArgumentException(s"unknown matcher code: $code")
    )
}
