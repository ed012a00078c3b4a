package repro.jobs

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._
import repro.baselines.{DeepBlocker, ZeroER}
import repro.blocking.{BlockingMetrics, ExactKnnBlocker}
import repro.core.{Harness, Pipeline, Tab}
import repro.data._
import repro.embed.{ModelRegistry, Vectorizer}
import repro.matching.supervised.SupervisedMatcher

/** spark-submit entrypoints, one per paper table. Each prints the same
  * rows as the corresponding bench suite (bench/…/TableNBench) without
  * the assertions, for ad-hoc runs:
  *
  *   spark-submit --class repro.jobs.Table4Job target/scala-2.13/repro_2.13-*.jar
  */
object JobSpark {
  def session(name: String): SparkSession = {
    val s = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    s.sparkContext.setLogLevel("WARN")
    s
  }
}

object Table1Job {
  def main(args: Array[String]): Unit = {
    val rows = Seq(Seq("Model", "Code", "Dim.", "Seq.", "Param.", "Blocking", "Matching")) ++
      ModelRegistry.all.map(m => Seq(m.name, m.code, m.dim.toString,
        if (m.seqLen == 0) "-" else m.seqLen.toString,
        if (m.paramsM == 0) "-" else s"${m.paramsM}M", m.blockingRefs, m.matchingRefs))
    Tab.print("Table 1", rows)
  }
}

object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("table2")
    val rowsA = scala.collection.mutable.ArrayBuffer(
      Seq("ds", "|V1|", "|V2|", "|A1|", "|A2|", "|D|", "|S|"))
    DatasetProfiles.all.foreach { p =>
      val (v1, v2, a1, a2, d, s) = ERSynth.stats(spark, p)
      rowsA += Seq(p.name, v1.toString, v2.toString, a1.toString, a2.toString, d.toString, Tab.f(s, 2))
    }
    Tab.print("Table 2(a)", rowsA.toSeq)

    val rowsB = scala.collection.mutable.ArrayBuffer(Seq("ds", "|V|", "|D|", "|S|"))
    FebrlSynth.TableSizes.foreach { case (name, n) =>
      val d = FebrlSynth.duplicatePairs(spark, n).count()
      val s = FebrlSynth.entities(spark, math.min(n, 50000L))
        .agg(avg(length(col("sentence")))).head.getDouble(0)
      rowsB += Seq(name, n.toString, d.toString, Tab.f(s, 2))
    }
    Tab.print("Table 2(b)", rowsB.toSeq)
    spark.stop()
  }
}

object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("table3")
    val rows = scala.collection.mutable.ArrayBuffer(
      Seq("ds", "src1", "src2", "total", "test", "dups", "attrs"))
    SupervisedSynth.all.foreach { p =>
      val df = SupervisedSynth.pairs(spark, p).cache()
      rows += Seq(p.name, p.src1, p.src2, df.count().toString,
        df.filter(col("split") === "test").count().toString,
        df.filter(col("label") === 1).count().toString, p.attrs.toString)
      df.unpersist()
    }
    Tab.print("Table 3", rows.toSeq)
    spark.stop()
  }
}

object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("table4")
    val models = ModelRegistry.all.map(_.code)
    val init = models.map { c =>
      val t0 = System.nanoTime(); Vectorizer.freshRuntime(c)
      Tab.f((System.nanoTime() - t0) / 1e6, 1)
    }
    Tab.print("Table 4 Init (ms)", Seq(models, init))

    models.foreach(Vectorizer.runtime)
    val scale = DatasetProfiles.benchScale
    val rows = scala.collection.mutable.ArrayBuffer(Seq("ds") ++ models)
    DatasetProfiles.all.foreach { p0 =>
      val p = p0.scaled(scale)
      rows += Seq(p0.name) ++ models.map(c => Tab.f(Harness.vectorizationSecs(spark, p, c), 2))
    }
    Tab.print(s"Table 4 transform (s), scale=$scale", rows.toSeq)
    spark.stop()
  }
}

object Table5aJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("table5a")
    val scale = DatasetProfiles.benchScale
    val ks = Seq(1, 5, 10)
    val rows = scala.collection.mutable.ArrayBuffer(
      Seq("ds") ++ ks.map(k => s"DB k=$k") ++ ks.map(k => s"S5 k=$k") ++ Seq("DBrec10", "S5rec10"))
    DatasetProfiles.all.foreach { p0 =>
      val p = p0.scaled(scale)
      val s1 = ERSynth.source(spark, p, 1).cache(); s1.count()
      val s2 = ERSynth.source(spark, p, 2).cache(); s2.count()
      val gt = ERSynth.groundTruth(spark, p)
      val side1Smaller = p.v1 <= p.v2
      val (q, i) = if (side1Smaller) (s1, s2) else (s2, s1)
      def canon(c: org.apache.spark.sql.DataFrame) =
        if (side1Smaller) c else c.select(col("id2").as("id1"), col("id1").as("id2"))
      var dbRec = 0.0; var s5Rec = 0.0
      val db = ks.map { k =>
        val b = DeepBlocker.block(q, i, k, tag = s"j5a-${p0.name}-$k")
        if (k == 10) dbRec = BlockingMetrics.recall(canon(b.candidates), gt)
        Tab.f(b.secs, 1)
      }
      val s5 = ks.map { k =>
        val t0 = System.nanoTime()
        val qv = Vectorizer.vectorize(q, "S5", s"${p0.name}#q").cache(); qv.count()
        val iv = Vectorizer.vectorize(i, "S5", s"${p0.name}#i").cache(); iv.count()
        val top = ExactKnnBlocker.topK(qv, iv, k).cache(); top.count()
        val secs = (System.nanoTime() - t0) / 1e9
        if (k == 10) s5Rec = BlockingMetrics.recall(
          canon(top.select(col("qid").as("id1"), col("nid").as("id2"))), gt)
        qv.unpersist(); iv.unpersist(); top.unpersist()
        Tab.f(secs, 1)
      }
      rows += Seq(p0.name) ++ db ++ s5 ++ Seq(Tab.f(dbRec), Tab.f(s5Rec))
      s1.unpersist(); s2.unpersist()
    }
    Tab.print(s"Table 5(a), scale=$scale", rows.toSeq)
    spark.stop()
  }
}

object Table5bJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("table5b")
    val scale = DatasetProfiles.benchScale
    val budget = sys.env.getOrElse("ZEROER_BUDGET_SEC", "30").toDouble
    val rows = scala.collection.mutable.ArrayBuffer(
      Seq("ds", "ZE t_p", "ZE t_m", "ZE F1", "S5 t_p", "S5 t_m(ms)", "S5 F1"))
    DatasetProfiles.all.foreach { p0 =>
      val p = p0.scaled(scale)
      val s1 = ERSynth.source(spark, p, 1).cache(); s1.count()
      val s2 = ERSynth.source(spark, p, 2).cache(); s2.count()
      val gt = ERSynth.groundTruth(spark, p)
      val ze = ZeroER.run(s1, s2, gt, budgetSecs = budget)
      val s5 = Pipeline.runOnSources(spark, p, s1, s2, gt, "S5", k = 10, delta = 0.5)
      rows += Seq(p0.name,
        ze.map(r => Tab.f(r.prepSecs, 1)).getOrElse("-"),
        ze.map(r => Tab.f(r.matchSecs, 2)).getOrElse("-"),
        ze.map(r => Tab.f(r.f1)).getOrElse("-"),
        Tab.f(s5.prepSecs, 1), Tab.f(s5.matchSecs * 1000, 0), Tab.f(s5.f1))
      s1.unpersist(); s2.unpersist()
    }
    Tab.print(s"Table 5(b), scale=$scale, budget=${budget}s", rows.toSeq)
    spark.stop()
  }
}

object Table6Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("table6")
    val rows = scala.collection.mutable.ArrayBuffer(
      Seq("model") ++ SupervisedSynth.all.flatMap(p => Seq(s"${p.name} t_t", "t_e", "F1")))
    ModelRegistry.supervisedModels.foreach { m =>
      val cells = scala.collection.mutable.ArrayBuffer[String](m.code)
      SupervisedSynth.all.foreach { p =>
        val r = SupervisedMatcher.run(spark, p, m)
        cells ++= Seq(Tab.f(r.trainSecs, 1), Tab.f(r.testSecs, 2), Tab.f(r.f1))
      }
      rows += cells.toSeq
    }
    Tab.print("Table 6", rows.toSeq)
    spark.stop()
  }
}
