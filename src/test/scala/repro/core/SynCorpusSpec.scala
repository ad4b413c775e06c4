package repro.core

import repro.SparkSpec
import repro.corpus.{CorpusGen, TableColumn}
import repro.dists.{EvalRegistry, PatternEval}

class SynCorpusSpec extends SparkSpec {

  private lazy val corpus = CorpusGen.generate(CorpusGen.relationalProfile(nCols = 150))

  test("generate produces the requested number of synthetic columns") {
    val syn = SynCorpus.generate(corpus, nSyn = 100, seed = 1L)
    assert(syn.size == 100)
    assert(syn.map(_.synId) == (0 until 100))
  }

  test("generation is deterministic in the seed") {
    val a = SynCorpus.generate(corpus, 50, 2L)
    val b = SynCorpus.generate(corpus, 50, 2L)
    assert(a == b)
    val c = SynCorpus.generate(corpus, 50, 3L)
    assert(a != c)
  }

  test("injected error comes from a different domain and is not already present") {
    val byId = corpus.map(c => c.colId -> c).toMap
    SynCorpus.generate(corpus, 200, 4L).foreach { sc =>
      val base = byId(sc.baseColId)
      assert(!sc.baseValues.contains(sc.errValue))
      // find the error's source domain: must differ from the base column's
      val sources = corpus.filter(_.values.contains(sc.errValue)).map(_.domainTag).toSet
      assert(!sources.contains(base.domainTag) || sources.size > 1,
        s"error '${sc.errValue}' may be valid in ${base.domainTag}")
    }
  }

  test("detections find pattern-SDC catches of cross-domain injections") {
    val patEval = new PatternEval("\\d+ [a-zA-Z]+")
    val registry = new EvalRegistry(IndexedSeq.empty, IndexedSeq.empty, IndexedSeq(patEval), IndexedSeq.empty)
    val plans = CandidateGen.enumerate(registry)
    val unitCols = (0 until 10).map { i =>
      TableColumn(s"u$i", "unit", (1 to 30).map(j => s"${i * 50 + j} oz"), Nil, 30)
    }
    val syn = IndexedSeq(
      SynCorpus.SynColumn(0, "u0", unitCols(0).values, "germany"),     // detectable
      SynCorpus.SynColumn(1, "u1", unitCols(1).values, "17 ml"),       // matches pattern: NOT detectable
    )
    val dets = SynCorpus.detections(spark, syn, plans)
    val detectedSyn = dets.map(_._1).toSet
    assert(detectedSyn.contains(0))
    assert(!detectedSyn.contains(1))
  }

  test("detection requires the pre-condition to hold on C(v^e)") {
    val patEval = new PatternEval("\\d+ [a-zA-Z]+")
    val registry = new EvalRegistry(IndexedSeq.empty, IndexedSeq.empty, IndexedSeq(patEval), IndexedSeq.empty)
    val plans = CandidateGen.enumerate(registry)
    // Mixed column: only 50% match the pattern → no m >= 0.85 holds.
    val mixed = (1 to 10).map(j => s"$j oz") ++ (1 to 10).map(j => s"word$j")
    val syn = IndexedSeq(SynCorpus.SynColumn(0, "m", mixed, "zzz-err"))
    val dets = SynCorpus.detections(spark, syn, plans)
    assert(dets.isEmpty)
  }

  test("detection pairs reference valid candidate indices") {
    val registry = new EvalRegistry(IndexedSeq.empty, IndexedSeq.empty,
      IndexedSeq(new PatternEval("\\d+ [a-zA-Z]+"), new PatternEval("[a-zA-Z]+\\d+")), IndexedSeq.empty)
    val plans = CandidateGen.enumerate(registry)
    val nCand = CandidateGen.totalCandidates(plans)
    val syn = SynCorpus.generate(corpus, 50, 5L)
    val dets = SynCorpus.detections(spark, syn, plans)
    dets.foreach { case (synId, candIdx) =>
      assert(synId >= 0 && synId < 50)
      assert(candIdx >= 0 && candIdx < nCand)
    }
  }
}
