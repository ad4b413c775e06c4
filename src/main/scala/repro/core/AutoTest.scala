package repro.core

import org.apache.spark.sql.SparkSession
import repro.corpus.{ColumnStore, TableColumn}
import repro.core.Assessment.AssessedCandidate
import repro.core.CandidateGen.EvalPlan
import repro.dists.{EvalRegistry, Patterns}
import repro.util.Det

/** End-to-end offline training (paper Fig 5): candidate generation →
  * statistical quality tests → CSS/FSS selection.
  */
object AutoTest {

  final case class AutoTestConfig(
      /** embedding centroid values sampled from the corpus (paper: 1000) */
      nCentroids: Int = 150,
      /** corpus-mined patterns (paper: 45) */
      nPatterns: Int = 40,
      hThreshold: Double = 0.8,
      pThreshold: Double = 0.05,
      minCoverageConfidence: Double = 0.9,
      useCohensH: Boolean = true,
      useChiSquared: Boolean = true,
      useWilson: Boolean = true,
      /** |C_syn| for distant-supervision recall estimation */
      nSyn: Int = 2000,
      bSize: Int = 500,
      bFpr: Double = 0.1,
      delta: Double = 1e-3,
      dropFamilies: Set[String] = Set.empty,
      maxLpCandidates: Int = 2500,
      seed: Long = 42,
  ) {
    def assessConfig: Assessment.AssessConfig = Assessment.AssessConfig(
      hThreshold, pThreshold, minCoverageConfidence, useCohensH, useChiSquared, useWilson)
  }

  /** Trained artefacts: R_all plus both selected variants.
    *
    * The raw contingency counts and full candidate plans are retained so the
    * sensitivity/ablation experiments (Tables 5, 7, 8) can re-assess and
    * re-select without re-running the Spark passes.
    */
  final case class TrainedModel(
      registry: EvalRegistry,
      assessed: IndexedSeq[AssessedCandidate],
      assessedPlans: IndexedSeq[EvalPlan],
      detections: IndexedSeq[(Int, Int)],
      nSyn: Int,
      coarse: Selection.SelectionResult,
      fine: Selection.SelectionResult,
      /** phase -> seconds (Fig 14-style breakdown) */
      timings: Map[String, Double],
      config: AutoTestConfig,
      /** all enumerated plans (pre-pruning) + their contingency counts */
      allPlans: IndexedSeq[EvalPlan],
      contingencyCounts: Array[Long],
      totalCols: Long,
  ) {
    def allConstraintsModel: SdcModel = new SdcModel(assessed.map(_.sdc), registry)
    def coarseModel: SdcModel = new SdcModel(coarse.selected.map(_.sdc), registry)
    def fineModel: SdcModel = new SdcModel(fine.selected.map(_.sdc), registry)

    /** Re-run selection with different budgets without re-assessing. */
    def reselect(bSize: Int = config.bSize, bFpr: Double = config.bFpr,
                 delta: Option[Double]): Selection.SelectionResult =
      Selection.select(assessed, detections, nSyn,
        Selection.SelectionConfig(bSize, bFpr, delta, config.maxLpCandidates, seed = config.seed))

    /** Re-run the statistical gates with different flags (Table 8's Wilson /
      * Cohen's-h ablations) from the stored contingency counts.
      */
    def reassess(assessCfg: Assessment.AssessConfig): IndexedSeq[AssessedCandidate] =
      Assessment.assess(allPlans, contingencyCounts, totalCols, assessCfg)

    /** Fine-Select over a filtered R_all (Table 7's drop-one-family
      * ablation): detections are remapped to the surviving candidates.
      */
    def selectSubset(keep: AssessedCandidate => Boolean,
                     delta: Option[Double] = Some(config.delta)): Selection.SelectionResult = {
      val kept = assessed.zipWithIndex.filter { case (a, _) => keep(a) }
      val remap = kept.map(_._2).zipWithIndex.toMap // old idx -> new idx
      val dets = detections.collect { case (s, c) if remap.contains(c) => (s, remap(c)) }
      Selection.select(kept.map(_._1), dets, nSyn,
        Selection.SelectionConfig(config.bSize, config.bFpr, delta,
          config.maxLpCandidates, seed = config.seed))
    }
  }

  /** Family prefix of an evaluator id ("cta:", "emb:", "pat:", "fun:"). */
  def familyOfEvalId(evalId: String): String = evalId.takeWhile(_ != ':') match {
    case "cta" => repro.dists.DomainEval.Cta
    case "emb" => repro.dists.DomainEval.Embedding
    case "pat" => repro.dists.DomainEval.Pattern
    case "fun" => repro.dists.DomainEval.Function
    case other => other
  }

  /** Sample centroid values: one random value from each of `n` random
    * columns (paper Sec 5.1 "randomly sample 1000 values as centroids").
    */
  def sampleCentroids(corpus: Seq[TableColumn], n: Int, seed: Long): Seq[String] = {
    val cols = corpus.toIndexedSeq
    (0 until n * 2).iterator
      .map { i =>
        val s = Det.combine(seed, 0xce7L, i.toLong)
        val col = cols(Det.nextInt(Det.combine(s, 1), cols.size))
        col.values(Det.nextInt(Det.combine(s, 2), col.values.size))
      }
      .distinct
      .take(n)
      .toSeq
  }

  def train(spark: SparkSession, corpus: Seq[TableColumn], cfg: AutoTestConfig = AutoTestConfig()): TrainedModel = {
    def timed[T](f: => T): (T, Double) = {
      val t0 = System.nanoTime()
      val r = f
      (r, (System.nanoTime() - t0) / 1e9)
    }

    // ---- candidate generation + statistical assessment -------------------
    val ((assessed0, plans, registry, counts), tCand) = timed {
      val centroids = sampleCentroids(corpus, cfg.nCentroids, cfg.seed)
      val corpusDf = ColumnStore.toDf(spark, corpus)
      val patterns = Patterns.minePatterns(ColumnStore.explode(corpusDf), topK = cfg.nPatterns)
      var registry = EvalRegistry.default(centroids, patterns)
      cfg.dropFamilies.foreach(f => registry = registry.dropFamily(f))
      val plans = CandidateGen.enumerate(registry)
      import spark.implicits._
      val counts = Assessment.contingency(spark, corpus.toDS(), plans)
      val assessed = Assessment.assess(plans, counts, corpus.size.toLong, cfg.assessConfig)
      (assessed, plans, registry, counts)
    }

    // ---- re-index surviving candidates for the recall pass ---------------
    val assessedIdx: Map[(String, Double, Double, Double), Int] =
      assessed0.zipWithIndex.map { case (a, i) => ((a.sdc.evalId, a.sdc.dIn, a.sdc.dOut, a.sdc.m), i) }.toMap
    val assessedPlans: IndexedSeq[EvalPlan] = plans.flatMap { p =>
      val kept = p.candidates.flatMap { c =>
        assessedIdx.get((c.evalId, c.dIn, c.dOut, c.m)).map(newIdx => c.copy(idx = newIdx))
      }
      if (kept.isEmpty) None else Some(p.copy(candidates = kept))
    }

    // ---- distant-supervision detections ----------------------------------
    val (detections, tSyn) = timed {
      val syn = SynCorpus.generate(corpus, cfg.nSyn, Det.combine(cfg.seed, 0x5151))
      SynCorpus.detections(spark, syn, assessedPlans)
    }

    // ---- CSS / FSS selection ---------------------------------------------
    val (coarse, tCoarse) = timed {
      Selection.select(assessed0, detections, cfg.nSyn,
        Selection.SelectionConfig(cfg.bSize, cfg.bFpr, None, cfg.maxLpCandidates, seed = cfg.seed))
    }
    val (fine, tFine) = timed {
      Selection.select(assessed0, detections, cfg.nSyn,
        Selection.SelectionConfig(cfg.bSize, cfg.bFpr, Some(cfg.delta), cfg.maxLpCandidates, seed = cfg.seed))
    }

    TrainedModel(registry, assessed0, assessedPlans, detections, cfg.nSyn, coarse, fine,
      timings = Map(
        "candidate-gen" -> (tCand + tSyn),
        "coarse-select" -> tCoarse,
        "fine-select"   -> tFine,
      ),
      config = cfg,
      allPlans = plans,
      contingencyCounts = counts,
      totalCols = corpus.size.toLong)
  }
}
