package repro.dists

import repro.domains.{Vocab, VocabDomain}
import repro.linalg.LinAlg
import repro.util.Det

/** Synthetic text embeddings (substitute for GloVe / SentenceBERT, DESIGN §2).
  *
  * Geometry: each NL domain owns a centroid vector; every vocabulary word is
  * its domain centroid plus word-specific noise, so same-domain values
  * cluster (the paper's Fig 4/6 picture) while out-of-domain and corrupted
  * values land far away. Out-of-vocabulary tokens get hash-random vectors at
  * a large radius — reproducing GloVe's OOV failure on uncommon-but-valid
  * names (Example 2).
  *
  *  - GloVe-sim: word-level, knows only the *common* vocabulary head; 10% of
  *    words are "hard" (larger noise), multiword values average token
  *    vectors.
  *  - SBERT-sim: phrase-level, knows the *full* vocabulary (subword
  *    generalisation), tighter noise, and is scaled down ~4x (SentenceBERT
  *    distances in the paper are ~1.2 vs GloVe's ~4–7).
  */
final class SynthEmbedding private (
    val name: String,
    dim: Int,
    tokenVecs: Map[String, Array[Double]],
    phraseVecs: Map[String, Array[Double]],
    oovSigma: Double,
    globalScale: Double,
) extends Serializable {

  /** Embed a (raw) value; total function, never fails. */
  def embed(raw: String): Array[Double] = {
    val v = DomainEval.normalize(raw)
    val vec =
      phraseVecs.get(v) match {
        case Some(p) => p
        case None =>
          val toks = v.split("\\s+").filter(_.nonEmpty)
          if (toks.isEmpty) oovVector(v)
          else {
            val acc = new Array[Double](dim)
            toks.foreach { t =>
              val tv = tokenVecs.getOrElse(t, oovVector(t))
              var i = 0
              while (i < dim) { acc(i) += tv(i); i += 1 }
            }
            LinAlg.scale(acc, 1.0 / toks.length)
          }
      }
    LinAlg.scale(vec, globalScale)
  }

  /** Euclidean distance between two values in this embedding space. */
  def distance(a: String, b: String): Double = LinAlg.euclidean(embed(a), embed(b))

  private def oovVector(t: String): Array[Double] = {
    val s = Det.combine(Det.hashString(name), Det.hashString("oov"), Det.hashString(t))
    Array.tabulate(dim)(i => oovSigma * Det.gaussian(Det.combine(s, i.toLong)))
  }
}

object SynthEmbedding {

  val Dim = 16
  private val CentroidSigma = 1.6
  private val OovSigma      = 1.8

  private def centroid(embName: String, domainName: String): Array[Double] = {
    val s = Det.combine(Det.hashString("centroid"), Det.hashString(domainName))
    // Centroids are shared across embedding models (both GloVe and SBERT see
    // the same world); embName only affects noise.
    val _ = embName
    Array.tabulate(Dim)(i => CentroidSigma * Det.gaussian(Det.combine(s, i.toLong)))
  }

  private def noisyWord(embName: String, domainName: String, word: String,
                        sigma: Double, hardFrac: Double): Array[Double] = {
    val c = centroid(embName, domainName)
    val ws = Det.combine(Det.hashString(embName), Det.hashString(domainName), Det.hashString(word))
    val s  = if (Det.uniform(Det.combine(ws, 0x4aad)) < hardFrac) sigma * 3.0 else sigma
    Array.tabulate(Dim)(i => c(i) + s * Det.gaussian(Det.combine(ws, i.toLong)))
  }

  /** Word-level GloVe-sim over the common heads of the given domains. */
  def glove(domains: Seq[VocabDomain] = Vocab.nlDomains): SynthEmbedding = {
    val tokens = scala.collection.mutable.Map.empty[String, Array[Double]]
    domains.foreach { d =>
      d.common.foreach { w =>
        w.split("\\s+").filter(_.nonEmpty).foreach { tok =>
          // First domain to claim a token wins (e.g. "georgia" state/country).
          if (!tokens.contains(tok))
            tokens(tok) = noisyWord("glove", d.name, tok, sigma = 0.40, hardFrac = 0.10)
        }
      }
    }
    new SynthEmbedding("glove", Dim, tokens.toMap, Map.empty, OovSigma, globalScale = 1.0)
  }

  /** Phrase-level SBERT-sim over the full vocabularies of the given domains. */
  def sbert(domains: Seq[VocabDomain] = Vocab.nlDomains): SynthEmbedding = {
    val phrases = scala.collection.mutable.Map.empty[String, Array[Double]]
    val tokens  = scala.collection.mutable.Map.empty[String, Array[Double]]
    domains.foreach { d =>
      d.all.foreach { w =>
        if (!phrases.contains(w))
          phrases(w) = noisyWord("sbert", d.name, w, sigma = 0.25, hardFrac = 0.08)
        w.split("\\s+").filter(_.nonEmpty).foreach { tok =>
          if (!tokens.contains(tok))
            tokens(tok) = noisyWord("sbert", d.name, tok, sigma = 0.30, hardFrac = 0.08)
        }
      }
    }
    new SynthEmbedding("sbert", Dim, tokens.toMap, phrases.toMap, OovSigma, globalScale = 0.25)
  }
}

/** Embedding-based domain evaluation: distance of v to a fixed centroid value
  * (paper Eq 2 — e.g. Glove distance to "january" represents month-name).
  */
final class EmbeddingCentroidEval(emb: SynthEmbedding, centroidValue: String) extends DomainEval {
  private val centroidVec = emb.embed(centroidValue)
  override val id: String = s"emb:${emb.name}:$centroidValue"
  override def family: String = DomainEval.Embedding
  override def distance(v: String): Double = LinAlg.euclidean(emb.embed(v), centroidVec)
}
