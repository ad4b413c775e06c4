package repro.domains

import org.scalatest.funsuite.AnyFunSuite
import repro.dists.Validators

class VocabSpec extends AnyFunSuite {

  test("all domains have unique names") {
    assert(Vocab.all.map(_.name).distinct.size == Vocab.all.size)
  }

  test("byName resolves every domain") {
    Vocab.all.foreach(d => assert(Vocab.byName(d.name) eq d))
  }

  test("paper running examples are actual vocab members") {
    assert(Vocab.month.all.contains("january"))
    assert(Vocab.city.all.contains("seattle"))
    assert(Vocab.country.all.contains("liechtenstein")) // the Fig 2 typo target
    assert(Vocab.stateCode.all.contains("fl"))
  }

  test("country common and uncommon are disjoint") {
    assert(Vocab.country.common.toSet.intersect(Vocab.country.uncommon.toSet).isEmpty)
  }

  test("50 state codes and 50 state names") {
    assert(Vocab.stateCodes.size == 50)
    assert(Vocab.stateNames.size == 50)
    assert(Vocab.stateCodes.distinct.size == 50)
  }

  test("12 months, 7 weekdays") {
    assert(Vocab.months.size == 12)
    assert(Vocab.weekdays.size == 7)
  }

  test("VocabDomain draw always returns a vocab member") {
    val d = Vocab.city
    (0 until 500).foreach { i =>
      assert(d.all.contains(d.draw(i.toLong)))
    }
  }

  test("VocabDomain draw favours common values (zipf head)") {
    val d = Vocab.country
    val draws = (0 until 4000).map(i => d.draw(i.toLong))
    val commonFrac = draws.count(d.common.contains).toDouble / draws.size
    assert(commonFrac > 0.6, s"commonFrac $commonFrac")
    // but the uncommon tail does appear — the Example 2 trap requires it
    assert(draws.exists(d.uncommon.contains))
  }

  test("fullName values are two tokens") {
    Vocab.fullName.all.take(50).foreach { n =>
      assert(n.split(" ").length == 2, n)
    }
  }

  test("synthWord is deterministic and plausible") {
    assert(Vocab.synthWord(7L) == Vocab.synthWord(7L))
    val w = Vocab.synthWord(123L)
    assert(w.length >= 2 && w.forall(_.isLetter))
  }

  test("genDate produces valid dates") {
    (0 until 300).foreach { i =>
      val d = Vocab.genDate(i.toLong)
      assert(Validators.validateDate(d), d)
    }
  }

  test("genIsoDate produces valid iso dates") {
    (0 until 100).foreach(i => assert(Validators.validateDate(Vocab.genIsoDate(i.toLong))))
  }

  test("genTime produces valid times") {
    (0 until 100).foreach(i => assert(Validators.validateTime(Vocab.genTime(i.toLong))))
  }

  test("genUrl produces valid urls") {
    (0 until 100).foreach(i => assert(Validators.validateUrl(Vocab.genUrl(i.toLong)), Vocab.genUrl(i.toLong)))
  }

  test("genEmail produces valid emails") {
    (0 until 100).foreach(i => assert(Validators.validateEmail(Vocab.genEmail(i.toLong))))
  }

  test("genIp produces valid ips") {
    (0 until 100).foreach(i => assert(Validators.validateIp(Vocab.genIp(i.toLong)), Vocab.genIp(i.toLong)))
  }

  test("genCreditCard passes Luhn validation") {
    (0 until 200).foreach { i =>
      val cc = Vocab.genCreditCard(i.toLong)
      assert(cc.length == 16 && cc.forall(_.isDigit), cc)
      assert(Validators.validateCreditCard(cc), cc)
    }
  }

  test("genFiscalYear matches the fyNN shape of Fig 2") {
    (0 until 50).foreach { i =>
      assert(Vocab.genFiscalYear(i.toLong).matches("fy\\d{2}"))
    }
  }

  test("genUnit matches the '12 oz' / '9.8 oz' shapes of Fig 2") {
    val units = (0 until 200).map(i => Vocab.genUnit(i.toLong))
    units.foreach(u => assert(u.matches("\\d+(\\.\\d+)? [a-z]+"), u))
    assert(units.exists(_.contains(".")), "expected some decimal quantities")
    assert(units.count(_.contains(".")) < units.size / 4)
  }

  test("genAlphaNumId matches letters-then-digits") {
    (0 until 50).foreach(i => assert(Vocab.genAlphaNumId(i.toLong).matches("[a-z]+\\d+")))
  }

  test("genAgeRange and genPayRange shapes") {
    (0 until 50).foreach { i =>
      assert(Vocab.genAgeRange(i.toLong).matches("\\d+-\\d+"))
      assert(Vocab.genPayRange(i.toLong).matches("\\$\\d+-\\d+k"))
    }
  }

  test("genGene produces mixed syntactic styles (the Fig 3 trap)") {
    val genes = (0 until 200).map(i => Vocab.genGene(i.toLong))
    val patterns = genes.map(repro.dists.Patterns.generalize).distinct
    assert(patterns.size >= 3, s"gene column should not have one dominant pattern: $patterns")
  }

  test("zip and phone shapes") {
    (0 until 50).foreach { i =>
      assert(Vocab.genZip(i.toLong).matches("\\d{5}"))
      assert(Validators.validatePhone(Vocab.genPhone(i.toLong)), Vocab.genPhone(i.toLong))
    }
  }

  test("metadata strings are nonempty and lowercase") {
    Vocab.metadataStrings.foreach { m =>
      assert(m.nonEmpty && m == m.toLowerCase)
    }
  }

  test("machine domains are flagged as machine, NL as not") {
    assert(Vocab.date.isMachine)
    assert(!Vocab.city.isMachine)
    assert(Vocab.nlDomains.forall(!_.isMachine))
    assert(Vocab.machineDomains.forall(_.isMachine))
  }
}
