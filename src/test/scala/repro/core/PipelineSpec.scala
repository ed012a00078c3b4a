package repro.core

import repro.SparkSpec
import repro.data.DatasetProfiles

class PipelineSpec extends SparkSpec {

  test("end-to-end S-GTR-T5 pipeline solves an easy dataset") {
    val p = DatasetProfiles("D4").scaled(0.05)
    val r = Pipeline.run(spark, p, "S5", k = 10, delta = 0.5)
    assert(r.f1 > 0.9, s"F1 ${r.f1}")
    assert(r.prepSecs > 0 && r.matchSecs >= 0)
    assert(r.nCandidates > 0)
  }

  test("pipeline respects k (candidates bounded by k * |smaller|)") {
    val p = DatasetProfiles("D1").scaled(0.2)
    val r = Pipeline.run(spark, p, "SM", k = 3, delta = 0.5)
    assert(r.nCandidates <= 3L * math.min(p.v1, p.v2))
  }

  test("higher delta cannot increase recall") {
    val p = DatasetProfiles("D5").scaled(0.03)
    val lo = Pipeline.run(spark, p, "SM", k = 10, delta = 0.3)
    val hi = Pipeline.run(spark, p, "SM", k = 10, delta = 0.7)
    assert(hi.recall <= lo.recall + 1e-9)
  }

  test("S-GTR-T5 beats a collapsed model end-to-end") {
    val p = DatasetProfiles("D5").scaled(0.03)
    val s5 = Pipeline.run(spark, p, "S5", k = 10, delta = 0.5)
    val xt = Pipeline.run(spark, p, "XT", k = 10, delta = 0.5)
    assert(s5.f1 > xt.f1, s"S5=${s5.f1} XT=${xt.f1}")
  }

  test("query direction: smaller side queries the larger one") {
    val p = DatasetProfiles("D9").scaled(0.01) // v1 << v2
    val r = Pipeline.run(spark, p, "SM", k = 5, delta = 0.1)
    assert(r.nCandidates <= 5L * p.scaled(0.01).v1 + 5L * p.v1) // bounded by smaller side
  }
}
