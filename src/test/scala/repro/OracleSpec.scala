package repro

import org.apache.spark.sql.functions._

/** The oracle must not only accept correct results — it must reject wrong
  * ones, otherwise every green test is meaningless.
  */
class OracleSpec extends SparkSpec {

  import spark.implicits._

  private lazy val t = Seq((1L, 10L), (1L, 20L), (2L, 5L)).toDF("k", "v")

  test("accepts a correct aggregate") {
    val df = t.groupBy("k").agg(sum($"v".cast("double")) as "s")
    Oracle.assertEquivalent(df, "SELECT k, SUM(CAST(v AS DOUBLE)) AS s FROM t GROUP BY k", "t" -> t)
  }

  test("rejects a wrong aggregate value") {
    val df = t.groupBy("k").agg((sum($"v".cast("double")) + 1.0) as "s")
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(df, "SELECT k, SUM(CAST(v AS DOUBLE)) AS s FROM t GROUP BY k", "t" -> t)
    }
  }

  test("rejects missing rows") {
    val df = t.where($"k" === 1).groupBy("k").agg(sum($"v".cast("double")) as "s")
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(df, "SELECT k, SUM(CAST(v AS DOUBLE)) AS s FROM t GROUP BY k", "t" -> t)
    }
  }

  test("rejects mismatched column sets") {
    val df = t.groupBy("k").agg(sum($"v".cast("double")) as "wrongname")
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(df, "SELECT k, SUM(CAST(v AS DOUBLE)) AS s FROM t GROUP BY k", "t" -> t)
    }
  }

  test("column order does not matter, only names and values") {
    val df = t.groupBy("k").agg(sum($"v".cast("double")) as "s").select("s", "k")
    Oracle.assertEquivalent(df, "SELECT k, SUM(CAST(v AS DOUBLE)) AS s FROM t GROUP BY k", "t" -> t)
  }

  test("null aggregates on empty input match duckdb NULL") {
    val df = t.where($"k" > 100).agg(sum($"v".cast("double")) as "s")
    Oracle.assertEquivalent(df,
      "SELECT SUM(CAST(v AS DOUBLE)) AS s FROM t WHERE CAST(k AS BIGINT) > 100", "t" -> t)
  }
}
