package repro

import org.apache.spark.sql.functions._

class OracleSpec extends SparkSpec {

  test("oracle accepts an equivalent aggregate") {
    import spark.implicits._
    val t = Seq((1L, "a"), (2L, "b"), (3L, "a")).toDF("id", "tag")
    val agg = t.groupBy("tag").agg(count(lit(1)).cast("long").as("n"))
    Oracle.assertEquivalent(agg, "SELECT tag, count(*) AS n FROM t GROUP BY tag", "t" -> t)
  }

  test("oracle rejects a wrong result") {
    import spark.implicits._
    val t = Seq((1L, "a"), (2L, "b")).toDF("id", "tag")
    val wrong = Seq(("a", 99L)).toDF("tag", "n")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong, "SELECT tag, count(*) AS n FROM t GROUP BY tag", "t" -> t)
    }
  }

  test("oracle rejects mismatched column names") {
    import spark.implicits._
    val t = Seq((1L, "a")).toDF("id", "tag")
    val df = t.select(col("id").as("wrong_name"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df, "SELECT id FROM t", "t" -> t)
    }
  }

  test("oracle canonicalizes doubles") {
    import spark.implicits._
    val t = Seq((1L, 2.5), (2L, 3.5)).toDF("id", "x")
    val agg = t.agg(avg(col("x")).as("m"))
    Oracle.assertEquivalent(agg, "SELECT avg(CAST(x AS DOUBLE)) AS m FROM t", "t" -> t)
  }

  test("oracle handles nulls") {
    import spark.implicits._
    val t = Seq((1L, Some("a")), (2L, None)).toDF("id", "tag")
    val sel = t.select("id", "tag")
    Oracle.assertEquivalent(sel, "SELECT id, tag FROM t", "t" -> t)
  }
}
