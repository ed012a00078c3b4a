package repro.matching.supervised

import repro.SparkSpec
import repro.data.SupervisedSynth
import repro.embed.ModelRegistry

class SupervisedMatcherSpec extends SparkSpec {

  private lazy val resRA = SupervisedMatcher.run(spark, SupervisedSynth.DSM2, ModelRegistry("RA"))
  private lazy val resXT = SupervisedMatcher.run(spark, SupervisedSynth.DSM2, ModelRegistry("XT"))

  test("fine-tuned RoBERTa reaches useful F1 on DSM2") {
    assert(resRA.f1 > 0.6, s"F1 ${resRA.f1}")
  }

  test("fine-tuning rescues a model that collapses unsupervised (XLNet)") {
    assert(resXT.f1 > 0.55, s"XLNet supervised F1 ${resXT.f1}")
  }

  test("times are measured and training dominates testing") {
    assert(resRA.trainSecs > 0 && resRA.testSecs >= 0)
    assert(resRA.trainSecs > resRA.testSecs)
  }

  test("XLNet is slower to fine-tune than RoBERTa (Table 6 shape)") {
    assert(resXT.trainSecs > resRA.trainSecs,
      s"XT=${resXT.trainSecs} RA=${resRA.trainSecs}")
  }

  test("encoder unit costs follow the paper's time ordering") {
    def u(c: String) = SupervisedMatcher.encoderUnits(ModelRegistry(c))
    assert(u("XT") > u("BT"), "XLNet slowest")
    assert(u("SM") < u("SA") && u("SA") < u("BT"), "MiniLM fastest dynamic")
    assert(u("DT") < u("BT"), "DistilBERT cheaper than BERT")
    assert(u("FT") == u("GE"), "static models share the DeepMatcher path")
  }

  test("result carries model and dataset identifiers") {
    assert(resRA.modelCode == "RA" && resRA.dataset == "DSM2")
    assert(resRA.chosenEpoch >= 0)
  }
}
