package repro.baselines

import repro.SparkSpec
import repro.data.{DatasetProfiles, ERSynth}

class ZeroERSpec extends SparkSpec {

  test("levSim basics") {
    assert(ZeroER.levSim("abc", "abc") == 1.0)
    assert(ZeroER.levSim("", "") == 1.0)
    assert(ZeroER.levSim("abc", "") == 0.0)
    assert(math.abs(ZeroER.levSim("kitten", "sitting") - (1.0 - 3.0 / 7)) < 1e-9)
  }

  test("levSim is symmetric") {
    assert(ZeroER.levSim("abcd", "axcd") == ZeroER.levSim("axcd", "abcd"))
  }

  test("levSim caps long strings") {
    val a = "x" * 2000; val b = "x" * 1999 + "y"
    val s = ZeroER.levSim(a, b)
    assert(s >= 0.0 && s <= 1.0)
  }

  test("jaccard basics") {
    assert(ZeroER.jaccard(Set("a"), Set("a")) == 1.0)
    assert(ZeroER.jaccard(Set.empty, Set.empty) == 1.0)
    assert(ZeroER.jaccard(Set("a"), Set("b")) == 0.0)
    assert(ZeroER.jaccard(Set("a", "b"), Set("b", "c")) == 1.0 / 3)
  }

  test("emPosteriors separates two clear clusters") {
    val feats = Array.tabulate(200) { i =>
      if (i < 40) Array(0.9 + 0.02 * (i % 5), 0.85) else Array(0.1 + 0.02 * (i % 5), 0.15)
    }
    val post = ZeroER.emPosteriors(feats, () => ())
    assert(post.take(40).forall(_ > 0.5), "high-similarity rows in the match component")
    assert(post.drop(40).forall(_ < 0.5), "low-similarity rows in the unmatch component")
  }

  test("emPosteriors handles empty input") {
    assert(ZeroER.emPosteriors(Array.empty, () => ()).isEmpty)
  }

  test("overlap blocking finds duplicate pairs as candidates") {
    val p = DatasetProfiles("D4").scaled(0.03)
    val s1 = ERSynth.source(spark, p, 1)
    val s2 = ERSynth.source(spark, p, 2)
    val cands = ZeroER.overlapBlocking(s1, s2).collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    val gt = ERSynth.groundTruth(spark, p).collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    val rec = gt.count(cands.contains).toDouble / gt.size
    assert(rec > 0.7, s"overlap blocking recall $rec")
  }

  test("end-to-end ZeroER works on clean bibliographic data (D4-like)") {
    val p = DatasetProfiles("D4").scaled(0.03)
    val res = ZeroER.run(
      ERSynth.source(spark, p, 1), ERSynth.source(spark, p, 2),
      ERSynth.groundTruth(spark, p), budgetSecs = 120)
    assert(res.isDefined, "must terminate on a small clean dataset")
    assert(res.get.f1 > 0.5, s"F1 ${res.get.f1}")
    assert(res.get.prepSecs > 0 && res.get.matchSecs > 0)
  }

  test("misplaced values break schema-based ZeroER (the paper's D1 result)") {
    val pGood = DatasetProfiles("D4").scaled(0.03)
    // 0.5 maximizes the chance that exactly one side rotated its attributes
    val pBad  = pGood.copy(misplaceRate = 0.5)
    def f1Of(p: repro.data.CleanProfile): Double =
      ZeroER.run(ERSynth.source(spark, p, 1), ERSynth.source(spark, p, 2),
        ERSynth.groundTruth(spark, p), budgetSecs = 120).map(_.f1).getOrElse(0.0)
    val good = f1Of(pGood)
    val bad  = f1Of(pBad)
    assert(bad < good * 0.75, s"misplaced values must hurt ZeroER: good=$good bad=$bad")
  }

  test("budget exhaustion returns None") {
    val p = DatasetProfiles("D3").scaled(0.1) // long product descriptions
    val res = ZeroER.run(
      ERSynth.source(spark, p, 1), ERSynth.source(spark, p, 2),
      ERSynth.groundTruth(spark, p), budgetSecs = 0.001)
    assert(res.isEmpty)
  }
}
