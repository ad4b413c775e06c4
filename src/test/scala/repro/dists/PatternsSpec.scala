package repro.dists

import repro.SparkSpec
import repro.Oracle
import repro.corpus.{ColumnStore, TableColumn}

class PatternsSpec extends SparkSpec {

  test("generalize maps digits to \\d+") {
    assert(Patterns.generalize("12345") == "\\d+")
  }

  test("generalize maps letters to [a-zA-Z]+") {
    assert(Patterns.generalize("hello") == "[a-zA-Z]+")
    assert(Patterns.generalize("HeLLo") == "[a-zA-Z]+")
  }

  test("generalize of Fig 2 movie-id shape") {
    assert(Patterns.generalize("tt0054215") == "[a-zA-Z]+\\d+")
  }

  test("generalize of Fig 2 unit shape '12 oz'") {
    assert(Patterns.generalize("12 oz") == "\\d+ [a-zA-Z]+")
  }

  test("generalize keeps punctuation literally") {
    assert(Patterns.generalize("1/2/2020") == "\\d+/\\d+/\\d+")
    assert(Patterns.generalize("a-b.c") == "[a-zA-Z]+-[a-zA-Z]+.[a-zA-Z]+")
  }

  test("generalize collapses whitespace runs to one space") {
    assert(Patterns.generalize("a   b") == "[a-zA-Z]+ [a-zA-Z]+")
  }

  test("generalize trims input") {
    assert(Patterns.generalize("  42 ") == "\\d+")
  }

  test("generalize of empty/null is <empty>") {
    assert(Patterns.generalize("") == "<empty>")
    assert(Patterns.generalize(null) == "<empty>")
    assert(Patterns.generalize("   ") == "<empty>")
  }

  test("generalize truncates very long patterns") {
    val long = (1 to 50).map(i => s"a$i").mkString("-")
    assert(Patterns.generalize(long).length <= 61)
  }

  test("PatternEval distance is 0/1 (Eq 3)") {
    val e = new PatternEval("\\d+ [a-zA-Z]+")
    assert(e.distance("12 oz") == 0.0)
    assert(e.distance("0.05%") == 1.0) // the Fig 2 C6 error
    assert(e.family == DomainEval.Pattern)
  }

  test("minePatterns finds dominant patterns of a synthetic corpus") {
    val cols = Seq(
      TableColumn("c1", "id", (1 to 20).map(i => s"ab$i"), Nil, 20),
      TableColumn("c2", "id", (1 to 20).map(i => s"xy$i"), Nil, 20),
      TableColumn("c3", "unit", (1 to 20).map(i => s"$i oz"), Nil, 20),
      TableColumn("c4", "mixed", Seq("a1", "2 oz", "zzz", "9.9", "b-2", "x_1"), Nil, 6),
    )
    val df = ColumnStore.toDf(spark, cols)
    val mined = Patterns.minePatterns(ColumnStore.explode(df), topK = 10)
    assert(mined.contains("[a-zA-Z]+\\d+"))
    assert(mined.contains("\\d+ [a-zA-Z]+"))
    // the mixed column dominates nothing
    assert(!mined.contains("[a-zA-Z]+-\\d+"))
  }

  test("minePatterns respects topK") {
    val cols = (0 until 30).map { i =>
      TableColumn(s"c$i", "d", (1 to 10).map(j => s"p${i}v$j${"!" * (i % 7)}"), Nil, 10)
    }
    val df = ColumnStore.toDf(spark, cols)
    val mined = Patterns.minePatterns(ColumnStore.explode(df), topK = 3)
    assert(mined.size <= 3)
  }

  test("pattern dominance counts agree with DuckDB (oracle)") {
    import org.apache.spark.sql.functions._
    val cols = Seq(
      TableColumn("c1", "id", (1 to 10).map(i => s"ab$i"), Nil, 10),
      TableColumn("c2", "unit", (1 to 10).map(i => s"$i oz"), Nil, 10),
      TableColumn("c3", "id", (1 to 10).map(i => s"q$i"), Nil, 10),
    )
    val exploded = ColumnStore.explode(ColumnStore.toDf(spark, cols))
    val genUdf = udf((v: String) => Patterns.generalize(v))
    val patDf = exploded.select(col("col_id"), genUdf(col("value")).as("pattern"))
    val agg = patDf.groupBy("pattern").agg(count(lit(1)).as("n")).orderBy("pattern")
    Oracle.assertEquivalent(
      agg,
      "SELECT pattern, COUNT(*) AS n FROM pats GROUP BY pattern ORDER BY pattern",
      "pats" -> patDf)
  }
}
