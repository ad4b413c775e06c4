package repro.dists

import repro.domains.Vocab

/** The full bank of domain-evaluation functions used for candidate
  * generation (paper Sec 5.1):
  *
  *   - CTA: Sherlock-sim + Doduo-sim classifier banks (one per NL domain),
  *   - Embedding: GloVe-sim + SBERT-sim, each with corpus-sampled centroid
  *     values ("seattle", "january", ...),
  *   - Pattern: corpus-mined character-class patterns,
  *   - Function: the 8 validation functions.
  *
  * Counts are scaled down from the paper's (199 + 2000 + 45 + 8) to keep the
  * pipeline in-container; every count is a parameter (DESIGN §2).
  */
final class EvalRegistry(
    val ctaEvals: IndexedSeq[DomainEval],
    val embeddingEvals: IndexedSeq[DomainEval],
    val patternEvals: IndexedSeq[DomainEval],
    val functionEvals: IndexedSeq[DomainEval],
) extends Serializable {

  val all: IndexedSeq[DomainEval] =
    ctaEvals ++ embeddingEvals ++ patternEvals ++ functionEvals

  val byId: Map[String, DomainEval] = all.map(e => e.id -> e).toMap

  def byFamily(family: String): IndexedSeq[DomainEval] = family match {
    case DomainEval.Cta       => ctaEvals
    case DomainEval.Embedding => embeddingEvals
    case DomainEval.Pattern   => patternEvals
    case DomainEval.Function  => functionEvals
    case other                => throw new IllegalArgumentException(s"unknown family $other")
  }

  /** Registry without one family — used by the Table 7 ablation. */
  def dropFamily(family: String): EvalRegistry = family match {
    case DomainEval.Cta       => new EvalRegistry(IndexedSeq.empty, embeddingEvals, patternEvals, functionEvals)
    case DomainEval.Embedding => new EvalRegistry(ctaEvals, IndexedSeq.empty, patternEvals, functionEvals)
    case DomainEval.Pattern   => new EvalRegistry(ctaEvals, embeddingEvals, IndexedSeq.empty, functionEvals)
    case DomainEval.Function  => new EvalRegistry(ctaEvals, embeddingEvals, patternEvals, IndexedSeq.empty)
    case other                => throw new IllegalArgumentException(s"unknown family $other")
  }
}

object EvalRegistry {

  lazy val gloveEmbedding: SynthEmbedding = SynthEmbedding.glove()
  lazy val sbertEmbedding: SynthEmbedding = SynthEmbedding.sbert()

  /** Assemble the default registry.
    *
    * @param centroidValues corpus-sampled values used as embedding centroids
    *                       (paper samples 1000; we default to a few hundred)
    * @param minedPatterns  corpus-mined character-class patterns
    */
  def default(centroidValues: Seq[String], minedPatterns: Seq[String]): EvalRegistry = {
    val cta = (CtaClassifier.sherlockBank(Vocab.nlDomains) ++
               CtaClassifier.doduoBank(Vocab.nlDomains)).toIndexedSeq
    val emb: IndexedSeq[DomainEval] = centroidValues.distinct.flatMap { c =>
      Seq(new EmbeddingCentroidEval(gloveEmbedding, c),
          new EmbeddingCentroidEval(sbertEmbedding, c))
    }.toIndexedSeq
    val pat: IndexedSeq[DomainEval] = minedPatterns.distinct.map(new PatternEval(_)).toIndexedSeq
    new EvalRegistry(cta, emb, pat, FunctionEval.allEvals)
  }
}
