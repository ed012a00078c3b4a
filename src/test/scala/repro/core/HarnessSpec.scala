package repro.core

import repro.SparkSpec
import repro.data.DatasetProfiles

class HarnessSpec extends SparkSpec {

  private lazy val run = Harness.runOne(spark, DatasetProfiles("D5").scaled(0.02), "S5", kMax = 16)

  test("runOne returns neighbours with ranks up to kMax") {
    assert(run.neighbours.nonEmpty)
    assert(run.neighbours.forall(_._4 >= 1))
    assert(run.neighbours.forall(_._4 <= 16))
  }

  test("recall is monotone in k") {
    val r1 = run.recallAt(1); val r5 = run.recallAt(5); val r10 = run.recallAt(10)
    assert(r1 <= r5 && r5 <= r10)
    assert(r10 > 0.5, s"recall@10 $r10 on an SBERT model")
  }

  test("candidatePairs canonicalizes to (side1, side2)") {
    val p = DatasetProfiles("D5").scaled(0.02)
    val cands = run.candidatePairs(5)
    assert(cands.forall { case (a, b) => a < p.v1 && b < p.v2 })
  }

  test("umcBest returns a grid threshold and consistent metrics") {
    val (d, p, r, f1, secs) = run.umcBest()
    assert(d >= 0.05 && d <= 0.95)
    assert(p >= 0 && p <= 1 && r >= 0 && r <= 1)
    assert(f1 <= 1.0 && f1 >= 0.0)
    assert(secs >= 0)
    if (p + r > 0) assert(math.abs(f1 - 2 * p * r / (p + r)) < 1e-6)
  }

  test("vectorization time is measured positive") {
    val secs = Harness.vectorizationSecs(spark, DatasetProfiles("D1").scaled(0.1), "GE")
    assert(secs > 0)
  }

  test("gt is the scaled profile's duplicate set") {
    val p = DatasetProfiles("D5").scaled(0.02)
    assert(run.gt.size == p.dups)
  }
}
