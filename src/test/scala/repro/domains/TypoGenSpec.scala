package repro.domains

import org.scalatest.funsuite.AnyFunSuite

class TypoGenSpec extends AnyFunSuite {

  test("typo differs from the input") {
    (0 until 500).foreach { i =>
      val v = Vocab.synthWord(i.toLong)
      assert(TypoGen.typo(v, i.toLong) != v)
    }
  }

  test("typo is deterministic in the seed") {
    assert(TypoGen.typo("february", 5L) == TypoGen.typo("february", 5L))
    assert(TypoGen.typo("february", 5L) != TypoGen.typo("february", 6L) ||
           TypoGen.typo("february", 5L) != TypoGen.typo("february", 7L))
  }

  test("typo stays within one edit of the input") {
    (0 until 300).foreach { i =>
      val v = "liechtenstein"
      val t = TypoGen.typo(v, i.toLong)
      assert(editDistance(v, t) <= 2, s"$v -> $t") // transpose counts as 2 subs
    }
  }

  test("typo rejects empty input") {
    intercept[IllegalArgumentException](TypoGen.typo("", 1L))
  }

  test("typo of single-character value still differs") {
    (0 until 50).foreach(i => assert(TypoGen.typo("a", i.toLong) != "a"))
  }

  test("typoAvoiding never lands on a valid value") {
    val valid = Vocab.months.toSet
    (0 until 300).foreach { i =>
      val base = Vocab.months(i % 12)
      val t = TypoGen.typoAvoiding(base, i.toLong, valid)
      assert(!valid.contains(t), s"$base -> $t")
    }
  }

  test("typoAvoiding on degenerate valid set appends marker") {
    // craft a valid set containing every possible 1-edit of "ab" is
    // impractical; instead check the fallback path stays non-valid
    val t = TypoGen.typoAvoiding("ab", 3L, Set("ab"))
    assert(t != "ab")
  }

  private def editDistance(a: String, b: String): Int = {
    val dp = Array.tabulate(a.length + 1, b.length + 1) { (i, j) =>
      if (i == 0) j else if (j == 0) i else 0
    }
    for (i <- 1 to a.length; j <- 1 to b.length) {
      dp(i)(j) = math.min(
        math.min(dp(i - 1)(j) + 1, dp(i)(j - 1) + 1),
        dp(i - 1)(j - 1) + (if (a(i - 1) == b(j - 1)) 0 else 1))
    }
    dp(a.length)(b.length)
  }
}
