package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core.{Harness, Tab}
import repro.data.DatasetProfiles
import repro.embed.ModelRegistry

/** Quick sanity sweep: blocking recall@10 and UMC-best F1 for every model
  * on a few small scaled datasets — used to verify the simulated model
  * families reproduce the paper's family ordering before running the full
  * benches.
  */
object Smoke {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master("local[*]").appName("smoke")
      .config("spark.sql.shuffle.partitions", "32")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    spark.sparkContext.setLogLevel("WARN")

    val scale = sys.env.getOrElse("REPRO_SCALE", "0.1").toDouble
    val dsNames = if (args.nonEmpty) args.toSeq else Seq("D2", "D4", "D5", "D10")
    val rows = scala.collection.mutable.ArrayBuffer[Seq[String]]()
    rows += Seq("model", "ds", "rec@1", "rec@10", "bestDelta", "F1", "vecS", "blkS")

    for (ds <- dsNames; m <- ModelRegistry.all) {
      val p = DatasetProfiles(ds).scaled(scale)
      val r = Harness.runOne(spark, p, m.code)
      val (d, _, _, f1, _) = r.umcBest()
      rows += Seq(m.code, ds, Tab.f(r.recallAt(1)), Tab.f(r.recallAt(10)),
        Tab.f(d, 2), Tab.f(f1), Tab.f(r.vecSecs, 1), Tab.f(r.blockSecs, 1))
      println(rows.last.mkString("  "))
    }
    Tab.print(s"smoke scale=$scale", rows.toSeq)
    spark.stop()
  }
}
