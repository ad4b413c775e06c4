package repro.core

import repro.dists.{DomainEval, EvalRegistry}

/** SDC candidate enumeration (paper Sec 5.1): for every domain-evaluation
  * function, grid-search (d_in, d_out, m) with fixed steps.
  *
  * Grids are family-specific because each family has a characteristic
  * distance range: CTA distances live in [0,1], embedding distances are
  * continuous (GloVe-sim ~[1.5, 10], SBERT-sim scaled ~4x smaller), and
  * pattern/function distances are 0/1 (so d_in = 0 and any d_out in (0,1)
  * are the only meaningful choices — cf. Example 3's r_6).
  */
object CandidateGen {

  /** Threshold grid for one evaluator. */
  final case class Grid(dIns: Seq[Double], dOuts: Seq[Double], ms: Seq[Double])

  // m is enumerated down to 0.70: columns with injected-error rates up to
  // ~25% (the Table 4 "+20%" setting) must still be coverable by some rule;
  // the statistical tests prune low-m variants that misbehave on the corpus.
  private val nlMs = Seq(0.60, 0.65, 0.70, 0.75, 0.80, 0.85, 0.90, 0.95)

  def gridFor(eval: DomainEval): Grid = eval.family match {
    case DomainEval.Cta =>
      Grid(dIns = Seq(0.15, 0.25, 0.45), dOuts = Seq(0.80, 0.90, 0.95), ms = nlMs)
    case DomainEval.Embedding =>
      if (eval.id.startsWith("emb:glove"))
        Grid(dIns = Seq(2.0, 2.5, 3.0, 4.0), dOuts = Seq(5.0, 6.0, 7.0, 8.0), ms = nlMs)
      else // sbert (globalScale 0.25)
        Grid(dIns = Seq(0.5, 0.65, 0.8, 1.0), dOuts = Seq(1.3, 1.6, 2.0, 2.4), ms = nlMs)
    case DomainEval.Pattern =>
      Grid(dIns = Seq(0.0), dOuts = Seq(0.5), ms = Seq(0.60, 0.65, 0.70, 0.75, 0.80, 0.85, 0.90, 0.95, 0.98))
    case DomainEval.Function =>
      Grid(dIns = Seq(0.0), dOuts = Seq(0.5), ms = Seq(0.60, 0.65, 0.70, 0.75, 0.80, 0.90, 0.95, 0.98, 0.99))
    case other => throw new IllegalArgumentException(s"unknown family $other")
  }

  /** Sorted distinct thresholds for one evaluator — the histogram bin edges
    * used by the assessment pass (DESIGN §5 "histogram trick").
    */
  def thresholds(eval: DomainEval): Array[Double] = {
    val g = gridFor(eval)
    (g.dIns ++ g.dOuts).distinct.sorted.toArray
  }

  /** One enumerated candidate; threshold indices refer to [[thresholds]]. */
  final case class Candidate(
      idx: Int,
      evalId: String,
      dIn: Double,
      dOut: Double,
      m: Double,
      dInIdx: Int,
      dOutIdx: Int,
  ) {
    def toSdc(confidence: Double): Sdc = Sdc(evalId, dIn, dOut, m, confidence)
  }

  /** Per-evaluator plan: evaluator + bin edges + its candidates. */
  final case class EvalPlan(eval: DomainEval, thresholds: Array[Double], candidates: IndexedSeq[Candidate])

  /** Enumerate the full candidate set over a registry, with stable global
    * candidate indices.
    */
  def enumerate(registry: EvalRegistry): IndexedSeq[EvalPlan] = {
    var nextIdx = 0
    registry.all.map { eval =>
      val g = gridFor(eval)
      val ts = thresholds(eval)
      val cands = for {
        dIn  <- g.dIns
        dOut <- g.dOuts if dOut > dIn
        m    <- g.ms
      } yield {
        val c = Candidate(nextIdx, eval.id, dIn, dOut, m,
          dInIdx = ts.indexWhere(_ == dIn), dOutIdx = ts.indexWhere(_ == dOut))
        nextIdx += 1
        c
      }
      EvalPlan(eval, ts, cands.toIndexedSeq)
    }
  }

  def totalCandidates(plans: Seq[EvalPlan]): Int = plans.iterator.map(_.candidates.size).sum

  /** Histogram of one column's distances under bin edges `ts`:
    * bucket i (< ts.length) counts distances d with
    * ts(i-1) < d <= ts(i); the last bucket counts d > ts.last.
    * Prefix sums over buckets give cntLE(ts(i)) exactly.
    */
  def histogram(dists: Array[Double], ts: Array[Double]): Array[Int] = {
    val h = new Array[Int](ts.length + 1)
    var i = 0
    while (i < dists.length) {
      val d = dists(i)
      var b = 0
      while (b < ts.length && d > ts(b)) b += 1
      h(b) += 1
      i += 1
    }
    h
  }

  /** In-place prefix sums: out(i) = #values <= ts(i). */
  def prefixCounts(hist: Array[Int]): Array[Int] = {
    val p = new Array[Int](hist.length)
    var acc = 0
    var i = 0
    while (i < hist.length) { acc += hist(i); p(i) = acc; i += 1 }
    p
  }
}
