package repro.dists

import org.scalatest.funsuite.AnyFunSuite
import repro.domains.Vocab

class CtaClassifierSpec extends AnyFunSuite {

  private val sherlockCountry = CtaClassifier("sherlock", Vocab.country, 0.70)
  private val sherlockState   = CtaClassifier("sherlock", Vocab.stateCode, 0.70)
  private val sherlockCity    = CtaClassifier("sherlock", Vocab.city, 0.70)
  private val doduoCountry    = CtaClassifier("doduo", Vocab.country, 0.95)

  test("scores live in [0,1] and distance = 1 - score (Eq 1)") {
    Seq("germany", "xqzzk", "12/3/2020", "", "Germany  ").foreach { v =>
      val s = sherlockCountry.score(v)
      assert(s >= 0.0 && s <= 1.0, s"score $s for '$v'")
      assert(math.abs(sherlockCountry.distance(v) - (1.0 - s)) < 1e-12)
    }
  }

  test("common in-type values score high (trained vocab)") {
    // at least most of the common head was in the 70% training slice
    val scores = Vocab.country.common.map(sherlockCountry.score)
    assert(scores.count(_ > 0.8) >= Vocab.country.common.size * 6 / 10)
  }

  test("out-of-type values score near zero") {
    assert(sherlockCountry.score("12/3/2020") < 0.3)
    assert(sherlockState.score("germany") < 0.3) // the Fig 2 C2 error
  }

  test("macro-vs-micro gap: valid-but-unseen values score mid, not high") {
    // Doduo trains on 95% of common: find a common value outside training.
    val unseen = Vocab.country.uncommon
    val mids = unseen.map(doduoCountry.score)
    // full-vocab membership gives [0.45, 0.75] ± calibration noise
    assert(mids.forall(s => s >= 0.36 && s <= 0.84), mids.take(3))
    assert(mids.sum / mids.size > 0.45 && mids.sum / mids.size < 0.72)
  }

  test("normalization: case and whitespace insensitive") {
    assert(sherlockCountry.score("Germany") == sherlockCountry.score(" germany "))
  }

  test("empty value scores 0") {
    assert(sherlockCountry.score("") == 0.0)
    assert(sherlockCountry.score(null) == 0.0)
  }

  test("typos of in-type values score below the in-vocab band") {
    val typo = sherlockCountry.score("liechstein") // Fig 2's real typo
    assert(typo < 0.45, s"typo scored $typo")
  }

  test("scores are deterministic") {
    assert(sherlockCity.score("seattle") == sherlockCity.score("seattle"))
  }

  test("different model banks disagree in detail but agree in kind") {
    val a = sherlockCountry.score("germany")
    val b = doduoCountry.score("germany")
    // Both recognise the value as in-type (>= full-vocab band), but their
    // exact scores differ (independent training slices + jitter).
    assert(a >= 0.45 && b >= 0.45)
    assert(a != b)
  }

  test("trigrams include boundary markers") {
    assert(CtaClassifier.trigrams("") == Seq("^$"))
    assert(CtaClassifier.trigrams("ab") == Seq("^ab", "ab$"))
    assert(CtaClassifier.trigrams("abc") == Seq("^ab", "abc", "bc$"))
  }

  test("banks cover every NL domain with stable ids") {
    val bank = CtaClassifier.sherlockBank(Vocab.nlDomains)
    assert(bank.size == Vocab.nlDomains.size)
    assert(bank.map(_.id).distinct.size == bank.size)
    bank.foreach(e => assert(e.id.startsWith("cta:sherlock:")))
    assert(bank.forall(_.family == DomainEval.Cta))
  }

  test("same-family classifier separates states from countries") {
    // "fl" should look state-like, not country-like
    assert(sherlockState.score("fl") > 0.8)
    assert(sherlockCountry.score("fl") < 0.5)
  }
}
