package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core.Tab
import repro.data.SupervisedSynth
import repro.embed.ModelRegistry
import repro.matching.supervised.SupervisedMatcher

/** Sanity sweep of supervised matching: dynamic models should recover
  * high F1 (fine-tuning nulls the BERT noise subspace) while static
  * models stay capped.
  */
object SupSmoke {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master("local[*]").appName("supsmoke")
      .config("spark.sql.shuffle.partitions", "32")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    spark.sparkContext.setLogLevel("WARN")

    val names = if (args.nonEmpty) args.toSeq else Seq("DSM2", "DSM1")
    val rows = scala.collection.mutable.ArrayBuffer[Seq[String]]()
    rows += Seq("model", "ds", "F1", "t_t", "t_e", "epoch")
    for (ds <- names; m <- ModelRegistry.supervisedModels) {
      val r = SupervisedMatcher.run(spark, SupervisedSynth.byName(ds), m)
      rows += Seq(m.code, ds, Tab.f(r.f1), Tab.f(r.trainSecs, 1), Tab.f(r.testSecs, 2), r.chosenEpoch.toString)
      println(rows.last.mkString("  "))
    }
    Tab.print("supervised smoke", rows.toSeq)
    spark.stop()
  }
}
