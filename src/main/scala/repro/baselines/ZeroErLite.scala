package repro.baselines

import repro.core.{Evaluation, PRF, SimGraph}

/** ZeroER-lite: unsupervised match classification via a two-component
  * 1-D Gaussian mixture over pair similarities, fitted with EM (the
  * core generative idea of ZeroER [Wu et al., SIGMOD 2020] reduced to a
  * single similarity feature — see DESIGN.md, substitutions).
  *
  * A pair is declared a match when the posterior of the higher-mean
  * component exceeds 0.5. No 1-1 constraint is enforced (ZeroER does
  * pair classification, not bipartite matching).
  */
object ZeroErLite {

  /** EM fit result. */
  final case class Fit(muMatch: Double, muNon: Double, sdMatch: Double, sdNon: Double, piMatch: Double)

  private def gauss(x: Double, mu: Double, sd: Double): Double = {
    val s = math.max(sd, 1e-6)
    math.exp(-(x - mu) * (x - mu) / (2 * s * s)) / (s * math.sqrt(2 * math.Pi))
  }

  /** Fit the two-component mixture to the weights with `iters` EM steps. */
  def fit(ws: Array[Double], iters: Int = 60): Fit = {
    require(ws.nonEmpty, "cannot fit an empty sample")
    val sorted = ws.sorted
    var muN = sorted(math.max(0, (sorted.length * 0.25).toInt - 1).max(0))
    var muM = sorted(math.min(sorted.length - 1, (sorted.length * 0.98).toInt))
    if (muM <= muN) muM = muN + 1e-3
    var sdN = 0.1; var sdM = 0.1; var piM = 0.05
    val resp = new Array[Double](ws.length)
    for (_ <- 0 until iters) {
      // E-step: responsibility of the match component.
      var i = 0
      while (i < ws.length) {
        val pm = piM * gauss(ws(i), muM, sdM)
        val pn = (1 - piM) * gauss(ws(i), muN, sdN)
        resp(i) = if (pm + pn == 0) 0.5 else pm / (pm + pn)
        i += 1
      }
      // M-step.
      val rm = resp.sum
      val rn = ws.length - rm
      if (rm > 1e-9 && rn > 1e-9) {
        val nMuM = ws.zip(resp).map { case (w, r) => w * r }.sum / rm
        val nMuN = ws.zip(resp).map { case (w, r) => w * (1 - r) }.sum / rn
        val nSdM = math.sqrt(ws.zip(resp).map { case (w, r) => r * (w - nMuM) * (w - nMuM) }.sum / rm)
        val nSdN = math.sqrt(ws.zip(resp).map { case (w, r) => (1 - r) * (w - nMuN) * (w - nMuN) }.sum / rn)
        muM = math.max(nMuM, nMuN); muN = math.min(nMuM, nMuN)
        sdM = math.max(if (nMuM >= nMuN) nSdM else nSdN, 1e-4)
        sdN = math.max(if (nMuM >= nMuN) nSdN else nSdM, 1e-4)
        piM = math.min(0.5, math.max(1e-4, rm / ws.length))
      }
    }
    Fit(muM, muN, sdM, sdN, piM)
  }

  /** Posterior P(match | w) under a fit. */
  def posterior(f: Fit, w: Double): Double = {
    val pm = f.piMatch * gauss(w, f.muMatch, f.sdMatch)
    val pn = (1 - f.piMatch) * gauss(w, f.muNon, f.sdNon)
    if (pm + pn == 0) 0.0 else pm / (pm + pn)
  }

  /** Classify every edge of the (normalized) graph; evaluate pair-level
    * P/R/F1 against the ground truth.
    */
  def evaluate(g: SimGraph, gt: Evaluation.GroundTruth): PRF =
    evaluateEdges(g, (0 until g.m).toArray, gt)

  /** ZeroER's protocol: classification runs over a *blocked* candidate
    * set, not the full Cartesian product of pairs. This variant keeps
    * each V1 entity's top-k edges as the candidate set, fits the mixture
    * there, and evaluates against the full ground truth — without the
    * blocking the ~1000:1 class imbalance of an unblocked similarity
    * graph degenerates the mixture fit.
    */
  def evaluateTopK(g: SimGraph, gt: Evaluation.GroundTruth, k: Int = 10): PRF = {
    if (g.m == 0) return PRF(0.0, 0.0)
    val taken = new Array[Int](g.n1)
    val cand = Array.newBuilder[Int]
    var e = 0
    while (e < g.m) { // edges are weight-descending: first k per src win
      val s = g.src(e)
      if (taken(s) < k) { taken(s) += 1; cand += e }
      e += 1
    }
    evaluateEdges(g, cand.result(), gt)
  }

  private def evaluateEdges(g: SimGraph, edges: Array[Int], gt: Evaluation.GroundTruth): PRF = {
    if (edges.isEmpty) return PRF(0.0, 0.0)
    val f = fit(edges.map(g.w))
    var tp = 0; var declared = 0
    for (e <- edges) {
      if (posterior(f, g.w(e)) > 0.5) {
        declared += 1
        if (gt.contains(g.src(e), g.dst(e))) tp += 1
      }
    }
    PRF(
      precision = if (declared == 0) 0.0 else tp.toDouble / declared,
      recall = if (gt.size == 0) 0.0 else tp.toDouble / gt.size,
    )
  }
}
