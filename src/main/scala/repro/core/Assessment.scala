package repro.core

import org.apache.spark.sql.{Dataset, SparkSession}
import repro.corpus.TableColumn
import repro.core.CandidateGen.EvalPlan
import repro.dists.DomainEval

/** Candidate quality assessment over a corpus (paper Sec 5.2).
  *
  * For every candidate r we compute the Table 2 contingency table
  * (covered × triggered over corpus columns) in one distributed pass:
  * each partition walks its columns, computes per-evaluator distance
  * histograms at the grid bin edges, derives (covered, triggered) for every
  * candidate of that evaluator from cumulative counts, and accumulates a
  * flat count array; partials are combined with treeReduce.
  *
  * The driver then applies the statistical gates — Cohen's h effect size,
  * chi-squared significance, Appendix B.1 coverage pruning — and calibrates
  * confidence (Wilson lower bound or the plain-ratio ablation).
  */
object Assessment {

  /** Table 2 contingency counts for one candidate. */
  final case class ContingencyCounts(ct: Long, cnt: Long, nct: Long, ncnt: Long) {
    /** covered columns */
    def nCovered: Long = ct + cnt
    /** ρ(r): triggered-rate among covered columns */
    def rho: Double = if (nCovered == 0) 0.0 else ct.toDouble / nCovered
    /** ρ̄(r): triggered-rate among non-covered columns */
    def rhoBar: Double = {
      val n = nct + ncnt
      if (n == 0) 0.0 else nct.toDouble / n
    }
  }

  /** A candidate that passed the statistical tests, with calibrated stats. */
  final case class AssessedCandidate(
      sdc: Sdc,
      counts: ContingencyCounts,
      fpr: Double,
      effectSize: Double,
      pValue: Double,
  )

  final case class AssessConfig(
      hThreshold: Double = 0.8,
      pThreshold: Double = 0.05,
      /** Appendix B.1: prune candidates whose confidence upper bound cannot
        * reach this level (equivalently a min-coverage cut).
        */
      minCoverageConfidence: Double = 0.9,
      useCohensH: Boolean = true,
      useChiSquared: Boolean = true,
      useWilson: Boolean = true,
      /** The corpus' base error rate (paper Sec 5.2: "~98% of columns are
        * error-free", i.e. ~2% dirty). Triggers on genuinely-dirty corpus
        * columns are true positives, not false positives (footnote 5), so
        * the FPR estimate is debiased by this expected noise floor —
        * without it, every narrow good rule pays ~2% of its coverage
        * against the B_FPR budget and the budget binds spuriously.
        */
      corpusDirtyRate: Double = 0.02,
  )

  /** Distributed contingency computation: returns a flat array with 4 slots
    * per global candidate index: [ct, cnt, nct, ncnt].
    */
  def contingency(spark: SparkSession, corpus: Dataset[TableColumn],
                  plans: IndexedSeq[EvalPlan]): Array[Long] = {
    val nCand = CandidateGen.totalCandidates(plans)
    val bcPlans = spark.sparkContext.broadcast(plans)
    corpus.rdd
      .mapPartitions { it =>
        val local = new Array[Long](nCand * 4)
        val ps = bcPlans.value
        it.foreach { col => accumulateColumn(col.values, ps, local) }
        Iterator.single(local)
      }
      .treeReduce { (a, b) =>
        var i = 0
        while (i < a.length) { a(i) += b(i); i += 1 }
        a
      }
  }

  /** Update the flat count array with one column's contribution. */
  private[core] def accumulateColumn(values: Seq[String], plans: IndexedSeq[EvalPlan],
                                     counts: Array[Long]): Unit = {
    val n = values.length
    if (n == 0) return
    val arr = values.toArray
    plans.foreach { plan =>
      val dists = distancesOf(plan.eval, arr)
      val prefix = CandidateGen.prefixCounts(CandidateGen.histogram(dists, plan.thresholds))
      plan.candidates.foreach { c =>
        val covered   = prefix(c.dInIdx).toDouble / n >= c.m
        val triggered = n - prefix(c.dOutIdx) >= 1
        val slot = c.idx * 4 + (if (covered) 0 else 2) + (if (triggered) 0 else 1)
        counts(slot) += 1
      }
    }
  }

  private[core] def distancesOf(eval: DomainEval, values: Array[String]): Array[Double] = {
    val out = new Array[Double](values.length)
    var i = 0
    while (i < values.length) { out(i) = eval.distance(values(i)); i += 1 }
    out
  }

  /** Apply the Sec 5.2 statistical gates and calibrate confidence. */
  def assess(plans: IndexedSeq[EvalPlan], counts: Array[Long], totalCols: Long,
             cfg: AssessConfig): IndexedSeq[AssessedCandidate] = {
    val minCoverage = Stats.minCoverageFor(cfg.minCoverageConfidence)
    val out = IndexedSeq.newBuilder[AssessedCandidate]
    plans.foreach { plan =>
      plan.candidates.foreach { c =>
        val base = c.idx * 4
        val cc = ContingencyCounts(counts(base), counts(base + 1), counts(base + 2), counts(base + 3))
        if (cc.nCovered >= minCoverage) {
          // Effect size: separation of the covered trigger-rate ρ from the
          // background ρ̄ (Eq 8; positive orientation = ρ below background).
          val h = Stats.cohensH(cc.rhoBar, cc.rho)
          val chi = Stats.chiSquared2x2(cc.ct, cc.cnt, cc.nct, cc.ncnt)
          val p = Stats.chiSquaredPValue1Dof(chi)
          val passH = !cfg.useCohensH || h >= cfg.hThreshold
          val passP = !cfg.useChiSquared || p <= cfg.pThreshold
          if (passH && passP) {
            val conf =
              if (cfg.useWilson) Stats.wilsonConfidence(cc.ct, cc.cnt)
              else Stats.plainConfidence(cc.ct, cc.cnt)
            if (conf > 0.0) {
              val fpr =
                if (totalCols == 0) 0.0
                else math.max(0.0, cc.ct - cfg.corpusDirtyRate * cc.nCovered) / totalCols
              out += AssessedCandidate(c.toSdc(conf), cc, fpr, h, p)
            }
          }
        }
      }
    }
    out.result()
  }
}
