package repro.dists

import repro.domains.VocabDomain
import repro.util.Det

/** CTA-classifier simulation (substitute for Sherlock / Doduo, see DESIGN §2).
  *
  * A classifier for type t scores a value v in [0, 1] (Eq 1 standardises it
  * to distance 1 − score). The simulation reproduces the calibration
  * behaviour the paper builds on:
  *
  *   - values in the classifier's *training vocabulary* score high (0.85+),
  *   - valid-but-unseen values score mid (0.45–0.75 if in the full domain
  *     vocabulary, else by character-trigram likelihood) — the Example 2
  *     "omayra" effect that breaks naive per-value thresholding,
  *   - out-of-type values score near 0 (trigram likelihood ratio ≈ 0).
  *
  * Sherlock-sim and Doduo-sim differ in which subset of the domain they were
  * "trained" on and in their score jitter, mimicking two independent model
  * families with overlapping coverage.
  */
final class CtaClassifier private (
    val id: String,
    trainSet: Set[String],
    fullSet: Set[String],
    triLogOdds: Map[String, Double],
    jitterSeed: Long,
) extends DomainEval {

  override def family: String = DomainEval.Cta

  /** Classifier similarity score in [0, 1]. */
  def score(raw: String): Double = {
    val v = DomainEval.normalize(raw)
    if (v.isEmpty) return 0.0
    val base =
      if (trainSet.contains(v)) 0.85 + 0.13 * Det.uniform(Det.combine(jitterSeed, Det.hashString(v)))
      else if (fullSet.contains(v)) 0.45 + 0.30 * Det.uniform(Det.combine(jitterSeed, 0x2, Det.hashString(v)))
      else 0.5 * trigramScore(v)
    // Per-value calibration noise: real neural CTA classifiers are not
    // cleanly banded per value, which is what defeats naive per-value
    // z-score thresholding (Example 2).
    val noise = 0.16 * (Det.uniform(Det.combine(jitterSeed, 0x3, Det.hashString(v))) - 0.5)
    math.min(1.0, math.max(0.0, base + noise))
  }

  override def distance(v: String): Double = 1.0 - score(v)

  /** Mean trigram log-likelihood-ratio vs background, squashed to [0, 1]. */
  private def trigramScore(v: String): Double = {
    val grams = CtaClassifier.trigrams(v)
    if (grams.isEmpty) 0.0
    else {
      var s = 0.0
      grams.foreach(g => s += triLogOdds.getOrElse(g, CtaClassifier.UnseenLogOdds))
      val avg = s / grams.size
      1.0 / (1.0 + math.exp(-avg)) // logistic squash of the average LLR
    }
  }
}

object CtaClassifier {

  /** LLR assigned to trigrams never seen in the type's vocabulary. */
  val UnseenLogOdds: Double = -4.0

  /** Character trigrams over "^value$" (boundary-marked). */
  def trigrams(v: String): Seq[String] = {
    val s = "^" + v + "$"
    if (s.length < 3) Seq(s) else (0 to s.length - 3).map(i => s.substring(i, i + 3))
  }

  /** Build a classifier for `domain`, trained on `trainFrac` of its common
    * vocabulary (model families differ in how much of the world they saw).
    */
  def apply(modelName: String, domain: VocabDomain, trainFrac: Double): CtaClassifier = {
    val seed = Det.combine(Det.hashString(modelName), Det.hashString(domain.name))
    val nTrain = math.max(1, math.round(domain.common.size * trainFrac).toInt)
    val trainWords = Det.shuffle(seed, domain.common).take(nTrain)

    // Trigram LLR: log P(g | type) − log P(g | background). The background
    // distribution is approximated as uniform over the trigram space actually
    // observed across this domain, which suffices for a monotone in-type vs
    // out-of-type separation once squashed.
    val counts = scala.collection.mutable.Map.empty[String, Int]
    var total = 0
    trainWords.foreach { w =>
      trigrams(w).foreach { g => counts(g) = counts.getOrElse(g, 0) + 1; total += 1 }
    }
    val vocabSize = math.max(counts.size, 1)
    val bg = 1.0 / (vocabSize * 8.0) // flat, rarer-than-type background mass
    val logOdds = counts.map { case (g, c) =>
      val p = (c + 0.5) / (total + 0.5 * vocabSize)
      g -> math.min(3.0, math.log(p / bg))
    }.toMap

    new CtaClassifier(
      id = s"cta:$modelName:${domain.name}",
      trainSet = trainWords.map(DomainEval.normalize).toSet,
      fullSet = domain.all.map(DomainEval.normalize).toSet,
      triLogOdds = logOdds,
      jitterSeed = seed,
    )
  }

  /** The Sherlock-sim classifier bank: one classifier per NL domain, trained
    * on 70% of each common vocabulary.
    */
  def sherlockBank(domains: Seq[VocabDomain]): IndexedSeq[CtaClassifier] =
    domains.map(d => apply("sherlock", d, 0.70)).toIndexedSeq

  /** The Doduo-sim classifier bank: broader training (95% of common vocab),
    * overlapping type coverage with Sherlock-sim.
    */
  def doduoBank(domains: Seq[VocabDomain]): IndexedSeq[CtaClassifier] =
    domains.map(d => apply("doduo", d, 0.95)).toIndexedSeq
}
