package repro.bench

import repro.SparkSpec
import repro.core.{Harness, Tab}
import repro.data.DatasetProfiles
import repro.embed.ModelRegistry

/** The effectiveness matrix behind Figures 3, 4 and 8 (blocking recall at
  * k ∈ {1, 5, 10}; UMC best-threshold precision/recall/F1 and the chosen
  * δ) for all 12 models × D1–D10, plus the paper's family-level ordering
  * checks. Not a numbered table, but these numbers carry the paper's
  * headline claims, so EXPERIMENTS.md records them.
  */
class EffectivenessBench extends SparkSpec {

  test("Figures 3/4/8: blocking recall and UMC matching per model and dataset") {
    val scale = DatasetProfiles.benchScale
    val models = ModelRegistry.all.map(_.code)
    val rows = scala.collection.mutable.ArrayBuffer(
      Seq("ds", "model", "rec@1", "rec@5", "rec@10", "delta", "P", "R", "F1"))
    // per-model averages for the ranking summary (Figure 4 / Figure 9)
    val recSum = scala.collection.mutable.Map.empty[String, Double].withDefaultValue(0.0)
    val f1Sum  = scala.collection.mutable.Map.empty[String, Double].withDefaultValue(0.0)

    DatasetProfiles.all.foreach { p0 =>
      val p = p0.scaled(scale)
      models.foreach { c =>
        val r = Harness.runOne(spark, p, c)
        val (d, pr, re, f1, _) = r.umcBest()
        recSum(c) += r.recallAt(10); f1Sum(c) += f1
        rows += Seq(p0.name, c, Tab.f(r.recallAt(1)), Tab.f(r.recallAt(5)),
          Tab.f(r.recallAt(10)), Tab.f(d, 2), Tab.f(pr), Tab.f(re), Tab.f(f1))
        println(rows.last.mkString("  "))
      }
    }
    Tab.print(s"Figures 3/8 data (scale=$scale)", rows.toSeq)

    val rec = models.map(c => c -> recSum(c) / 10).toMap
    val f1  = models.map(c => c -> f1Sum(c) / 10).toMap
    Tab.print("Average blocking recall@10 / UMC F1 per model (Figures 4/9)",
      Seq(Seq("model") ++ models, Seq("rec@10") ++ models.map(c => Tab.f(rec(c))),
        Seq("F1") ++ models.map(c => Tab.f(f1(c)))))

    // Family ordering (the paper's central result)
    def avg(codes: Seq[String], m: Map[String, Double]) = codes.map(m).sum / codes.size
    val sbert  = ModelRegistry.sbertModels.map(_.code)
    val static = ModelRegistry.staticModels.map(_.code)
    val bert   = ModelRegistry.bertModels.map(_.code)
    assert(avg(sbert, rec) > avg(static, rec), "SBERT > static on blocking recall")
    assert(avg(static, rec) > avg(bert, rec), "static > BERT on blocking recall")
    assert(avg(sbert, f1) > avg(static, f1), "SBERT > static on UMC F1")
    assert(avg(static, f1) > avg(bert, f1), "static > BERT on UMC F1")
    assert(rec("S5") == rec.values.max || f1("S5") == f1.values.max ||
           rec("S5") >= rec.values.max - 0.02, "S-GTR-T5 at/near the top")
    assert(rec("DT") == bert.map(rec).max, "DistilBERT best BERT model")
    assert(Seq("AT", "XT").forall(c => rec(c) <= bert.map(rec).min + 1e-9 ||
           rec(c) < 0.35), "AlBERT/XLNet collapse")
  }
}
