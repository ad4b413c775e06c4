package repro.core

import repro.{Oracle, SparkSpec}
import repro.corpus.TableColumn
import repro.dists.{EvalRegistry, PatternEval}

class AssessmentSpec extends SparkSpec {

  import spark.implicits._

  // A tiny registry with a single pattern evaluator keeps counts auditable.
  private val patEval = new PatternEval("\\d+ [a-zA-Z]+")
  private val registry = new EvalRegistry(IndexedSeq.empty, IndexedSeq.empty, IndexedSeq(patEval), IndexedSeq.empty)
  private val plans = CandidateGen.enumerate(registry)

  // 30 unit columns (all match), 1 unit column with an error, 30 other columns.
  private def unitCol(i: Int, withError: Boolean): TableColumn = {
    val base = (1 to 20).map(j => s"${i * 40 + j} oz")
    TableColumn(s"unit$i", "unit", if (withError) base :+ "oops" else base, Nil, 20)
  }
  private val corpus: Seq[TableColumn] =
    (0 until 30).map(i => unitCol(i, withError = false)) ++
    Seq(unitCol(99, withError = true)) ++
    (0 until 30).map(i => TableColumn(s"name$i", "name",
      (1 to 20).map(j => s"word${i}x$j"), Nil, 20))

  private lazy val counts = Assessment.contingency(spark, corpus.toDS(), plans)

  test("contingency counts sum to the corpus size for every candidate") {
    plans.head.candidates.foreach { c =>
      val s = (0 until 4).map(k => counts(c.idx * 4 + k)).sum
      assert(s == corpus.size, s"candidate ${c.idx}")
    }
  }

  test("contingency matches hand computation for m=0.95 pattern candidate") {
    val c = plans.head.candidates.find(_.m == 0.95).get
    val ct   = counts(c.idx * 4)     // covered & triggered: the error column
    val cnt  = counts(c.idx * 4 + 1) // covered & clean: 30 unit columns
    val nct  = counts(c.idx * 4 + 2)
    val ncnt = counts(c.idx * 4 + 3)
    assert(ct == 1, s"ct=$ct")       // 20/21 ≈ 0.952 >= 0.95, "oops" triggers
    assert(cnt == 30)
    assert(nct == 30)                // name columns: nothing matches → all "triggered"
    assert(ncnt == 0)
  }

  test("contingency counts agree with a DuckDB re-computation (oracle)") {
    // Reproduce covered/triggered per column relationally and cross-check.
    import org.apache.spark.sql.functions._
    val c = plans.head.candidates.find(_.m == 0.95).get
    val rows = corpus.map { col =>
      val dists = col.values.map(patEval.distance)
      val covered = dists.count(_ <= c.dIn).toDouble / dists.size >= c.m
      val triggered = dists.exists(_ > c.dOut)
      (col.colId, if (covered) 1 else 0, if (triggered) 1 else 0)
    }.toDF("col_id", "covered", "triggered")
    val agg = rows.select(
      sum(when(col("covered") === 1 && col("triggered") === 1, 1).otherwise(0)).cast("long").as("ct"),
      sum(when(col("covered") === 1 && col("triggered") === 0, 1).otherwise(0)).cast("long").as("cnt"),
      sum(when(col("covered") === 0 && col("triggered") === 1, 1).otherwise(0)).cast("long").as("nct"),
      sum(when(col("covered") === 0 && col("triggered") === 0, 1).otherwise(0)).cast("long").as("ncnt"))
    Oracle.assertEquivalent(
      agg,
      """SELECT
        |  SUM(CASE WHEN covered = '1' AND triggered = '1' THEN 1 ELSE 0 END) AS ct,
        |  SUM(CASE WHEN covered = '1' AND triggered = '0' THEN 1 ELSE 0 END) AS cnt,
        |  SUM(CASE WHEN covered = '0' AND triggered = '1' THEN 1 ELSE 0 END) AS nct,
        |  SUM(CASE WHEN covered = '0' AND triggered = '0' THEN 1 ELSE 0 END) AS ncnt
        |FROM rows""".stripMargin,
      "rows" -> rows)
    // and the distributed pass agrees with the relational recomputation
    val r = agg.collect()(0)
    assert(r.getLong(0) == counts(c.idx * 4))
    assert(r.getLong(1) == counts(c.idx * 4 + 1))
    assert(r.getLong(2) == counts(c.idx * 4 + 2))
    assert(r.getLong(3) == counts(c.idx * 4 + 3))
  }

  test("assess keeps well-separated candidates and calibrates confidence") {
    val assessed = Assessment.assess(plans, counts, corpus.size.toLong, Assessment.AssessConfig())
    assert(assessed.nonEmpty)
    val best = assessed.maxBy(_.sdc.confidence)
    assert(best.sdc.evalId == patEval.id)
    assert(best.sdc.confidence > 0.8 && best.sdc.confidence < 1.0)
    assert(best.effectSize >= 0.8)
    assert(best.pValue <= 0.05)
  }

  test("assess prunes candidates with insufficient coverage (Appendix B.1)") {
    // With a huge min-coverage confidence, nothing survives.
    val strict = Assessment.assess(plans, counts, corpus.size.toLong,
      Assessment.AssessConfig(minCoverageConfidence = 0.999))
    assert(strict.isEmpty)
  }

  test("FPR estimate is the noise-debiased ct / |C| (footnote 5)") {
    val cfg = Assessment.AssessConfig()
    val assessed = Assessment.assess(plans, counts, corpus.size.toLong, cfg)
    assessed.foreach { a =>
      val expected = math.max(0.0,
        a.counts.ct - cfg.corpusDirtyRate * a.counts.nCovered) / corpus.size
      assert(math.abs(a.fpr - expected) < 1e-12)
      assert(a.fpr <= a.counts.ct.toDouble / corpus.size) // never above the raw ratio
    }
  }

  test("FPR debias with zero dirty-rate reduces to the raw ratio") {
    val assessed = Assessment.assess(plans, counts, corpus.size.toLong,
      Assessment.AssessConfig(corpusDirtyRate = 0.0))
    assessed.foreach { a =>
      assert(math.abs(a.fpr - a.counts.ct.toDouble / corpus.size) < 1e-12)
    }
  }

  test("no-Wilson ablation yields higher (less safe) confidence") {
    val wilson = Assessment.assess(plans, counts, corpus.size.toLong,
      Assessment.AssessConfig(useWilson = true))
    val plain = Assessment.assess(plans, counts, corpus.size.toLong,
      Assessment.AssessConfig(useWilson = false))
    val wMap = wilson.map(a => (a.sdc.evalId, a.sdc.dIn, a.sdc.dOut, a.sdc.m) -> a.sdc.confidence).toMap
    plain.foreach { a =>
      wMap.get((a.sdc.evalId, a.sdc.dIn, a.sdc.dOut, a.sdc.m)).foreach { wc =>
        assert(a.sdc.confidence >= wc)
      }
    }
  }

  test("adversarial random-hash evaluators are rejected (Sec 6.5 robustness)") {
    // A hash-based pseudo-evaluator has no domain structure: coverage of any
    // (dIn, m) cell is arbitrary and triggers are uniform → the statistical
    // tests must reject all its candidates.
    val hashEval = new repro.dists.DomainEval {
      override val id = "hash:adversarial"
      override val family = repro.dists.DomainEval.Cta
      override def distance(v: String): Double = repro.util.Det.uniform(repro.util.Det.hashString(v))
    }
    val reg = new EvalRegistry(IndexedSeq(hashEval), IndexedSeq.empty, IndexedSeq.empty, IndexedSeq.empty)
    val hPlans = CandidateGen.enumerate(reg)
    val hCounts = Assessment.contingency(spark, corpus.toDS(), hPlans)
    val survivors = Assessment.assess(hPlans, hCounts, corpus.size.toLong, Assessment.AssessConfig())
    assert(survivors.isEmpty, s"adversarial candidates survived: ${survivors.map(_.sdc)}")
  }
}
