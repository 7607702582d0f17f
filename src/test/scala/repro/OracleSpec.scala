package repro

import org.apache.spark.sql.functions._

class OracleSpec extends SparkSpec {

  private lazy val kv = {
    import spark.implicits._
    Seq((1L, "a", 3), (2L, "b", 4), (3L, "a", 5)).toDF("id", "k", "v")
  }

  test("equivalent aggregations pass") {
    val agg = kv.groupBy("k").agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(agg, "SELECT k, count(*) AS cnt FROM t GROUP BY k", "t" -> kv)
  }

  test("row-level projections pass") {
    val proj = kv.select("id", "k")
    Oracle.assertEquivalent(proj, "SELECT id, k FROM t", "t" -> kv)
  }

  test("a wrong result is caught") {
    val wrong = kv.groupBy("k").agg((count(lit(1)) + 1) as "cnt")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong, "SELECT k, count(*) AS cnt FROM t GROUP BY k", "t" -> kv)
    }
  }

  test("a column-name mismatch is caught") {
    val agg = kv.groupBy("k").agg(count(lit(1)) as "n")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(agg, "SELECT k, count(*) AS cnt FROM t GROUP BY k", "t" -> kv)
    }
  }

  test("joins are checked faithfully") {
    val other = {
      import spark.implicits._
      Seq(("a", 10), ("b", 20)).toDF("k2", "w")
    }
    val joined = kv.join(other, kv("k") === other("k2"))
      .groupBy("k").agg(sum("w").cast("double") as "tw")
    Oracle.assertEquivalent(joined,
      "SELECT k, CAST(sum(CAST(w AS BIGINT)) AS DOUBLE) AS tw FROM t JOIN o ON t.k = o.k2 GROUP BY k",
      "t" -> kv, "o" -> other)
  }
}
