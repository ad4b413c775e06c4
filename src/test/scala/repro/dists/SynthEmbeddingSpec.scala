package repro.dists

import org.scalatest.funsuite.AnyFunSuite
import repro.domains.Vocab

class SynthEmbeddingSpec extends AnyFunSuite {

  private val glove = EvalRegistry.gloveEmbedding
  private val sbert = EvalRegistry.sbertEmbedding

  test("embedding is deterministic") {
    assert(glove.embed("seattle").toSeq == glove.embed("seattle").toSeq)
    assert(sbert.embed("hello world").toSeq == sbert.embed("hello world").toSeq)
  }

  test("same-domain common words cluster (months)") {
    val d = glove.distance("january", "february")
    assert(d < 4.0, s"january-february glove distance $d")
  }

  test("cross-domain words are far apart (month vs color — the paper's example)") {
    val near = glove.distance("january", "march")
    val far  = glove.distance("january", "yellow")
    assert(far > near * 1.5, s"near=$near far=$far")
  }

  test("typos are far from their source word (OOV hash vectors)") {
    val ok   = glove.distance("seattle", "chicago")
    val typo = glove.distance("seattle", "seattel")
    assert(typo > ok * 1.5, s"ok=$ok typo=$typo")
  }

  test("glove does not know uncommon vocabulary (Example 2 'omayra' effect)") {
    // An uncommon-but-valid city lands far in GloVe-sim...
    val uncommonCity = Vocab.city.uncommon.head
    val gd = glove.distance("seattle", uncommonCity)
    // ...but near in SBERT-sim, which knows the full vocabulary.
    val sd = sbert.distance("seattle", uncommonCity)
    val sNear = sbert.distance("seattle", "chicago")
    assert(gd > 5.0, s"glove should treat '$uncommonCity' as OOV, got $gd")
    assert(sd < sNear * 3.0, s"sbert should keep '$uncommonCity' near cities: $sd vs $sNear")
  }

  test("sbert distances are ~4x smaller than glove (paper scale difference)") {
    val g = glove.distance("january", "february")
    val s = sbert.distance("january", "february")
    assert(s < g, s"sbert=$s glove=$g")
  }

  test("sbert separates in-domain from typo") {
    val near = sbert.distance("seattle", "chicago")
    val typo = sbert.distance("seattle", "seattel")
    assert(typo > near * 1.5, s"near=$near typo=$typo")
  }

  test("multiword values embed via token averaging") {
    val d = glove.distance("new york", "new jersey") // shared token pulls them together
    val far = glove.distance("new york", "12 oz")
    assert(d < far)
  }

  test("empty value embeds without crashing") {
    assert(glove.embed("").length == SynthEmbedding.Dim)
    assert(sbert.embed("  ").length == SynthEmbedding.Dim)
  }

  test("EmbeddingCentroidEval implements Definition 1") {
    val e = new EmbeddingCentroidEval(glove, "january")
    assert(e.id == "emb:glove:january")
    assert(e.family == DomainEval.Embedding)
    assert(e.distance("january") < 1e-9)
    assert(e.distance("february") < e.distance("yellow"))
  }

  test("centroid eval reproduces the r_3 scenario: months near, errors far") {
    val e = new EmbeddingCentroidEval(glove, "january")
    val monthDists = Vocab.months.filterNot(_ == "january").map(e.distance)
    val typoDist = e.distance("febuary") // Fig 2's real typo
    assert(typoDist > monthDists.max, s"typo $typoDist vs months ${monthDists.max}")
  }

  test("normalization applies before embedding") {
    assert(glove.distance("Seattle", "seattle") < 1e-9)
  }
}
