package repro

import org.apache.spark.sql.functions._

/** The oracle must not only pass on equal results — it must FAIL on unequal
  * ones, or every oracle-backed test in this repo is vacuous.
  */
class OracleSpec extends SparkSpec {
  import spark.implicits._

  private lazy val small = Seq(("a", 1.0), ("a", 2.0), ("b", 5.0)).toDF("k", "v").cache()

  test("oracle accepts an equivalent aggregation") {
    val agg = small.groupBy("k").agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(agg, "SELECT k, COUNT(*) AS n FROM t GROUP BY k", "t" -> small)
  }
  test("oracle accepts doubles within formatting tolerance") {
    val agg = small.groupBy("k").agg(sum("v").as("s"))
    Oracle.assertEquivalent(agg, "SELECT k, SUM(CAST(v AS DOUBLE)) AS s FROM t GROUP BY k", "t" -> small)
  }
  test("oracle rejects a wrong aggregate value") {
    val wrong = small.groupBy("k").agg((count(lit(1)) + 1).as("n"))
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong, "SELECT k, COUNT(*) AS n FROM t GROUP BY k", "t" -> small)
    }
  }
  test("oracle rejects missing rows") {
    val filtered = small.where(col("k") === "a").groupBy("k").agg(count(lit(1)).as("n"))
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(filtered, "SELECT k, COUNT(*) AS n FROM t GROUP BY k", "t" -> small)
    }
  }
  test("oracle rejects mismatched column sets") {
    val agg = small.groupBy("k").agg(count(lit(1)).as("wrongname"))
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(agg, "SELECT k, COUNT(*) AS n FROM t GROUP BY k", "t" -> small)
    }
  }
  test("oracle is column-order insensitive") {
    val agg = small.groupBy("k").agg(count(lit(1)).as("n")).select("n", "k")
    Oracle.assertEquivalent(agg, "SELECT k, COUNT(*) AS n FROM t GROUP BY k", "t" -> small)
  }
  test("oracle handles nulls on both sides") {
    val df = Seq((Some("a"), 1), (None, 2)).toDF("k", "v").cache()
    val agg = df.select("k", "v")
    Oracle.assertEquivalent(agg, "SELECT k, v FROM t", "t" -> df)
  }
}
