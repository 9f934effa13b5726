package repro.data

import org.apache.spark.sql.functions.col
import repro.SparkSpec

class GenSpec extends SparkSpec {

  test("h produces values in [0, n)") {
    val df = spark.range(1000).select(Gen.h(col("id"), 7, 13) as "v")
    val mm = df.agg(org.apache.spark.sql.functions.min("v"), org.apache.spark.sql.functions.max("v")).collect()(0)
    assert(mm.getLong(0) >= 0 && mm.getLong(1) < 13)
  }

  test("hIn shifts the range to [lo, lo+n)") {
    val df = spark.range(1000).select(Gen.hIn(col("id"), 7, 100, 10) as "v")
    val mm = df.agg(org.apache.spark.sql.functions.min("v"), org.apache.spark.sql.functions.max("v")).collect()(0)
    assert(mm.getLong(0) >= 100 && mm.getLong(1) < 110)
  }

  test("h is invariant under repartitioning (unlike rand)") {
    val base = spark.range(500).select(col("id"), Gen.h(col("id"), 3, 97) as "v")
    val repart = spark.range(500).repartition(7).select(col("id"), Gen.h(col("id"), 3, 97) as "v")
    assert(base.collect().sortBy(_.getLong(0)).toSeq == repart.collect().sortBy(_.getLong(0)).toSeq)
  }

  test("different salts decorrelate") {
    val df = spark.range(2000).select(
      Gen.h(col("id"), 1, 2) as "x", Gen.h(col("id"), 2, 2) as "y")
    val same = df.where(col("x") === col("y")).count().toDouble
    assert(math.abs(same / 2000.0 - 0.5) < 0.1, s"correlated salts: $same/2000 equal")
  }

  test("values are roughly uniform") {
    val df = spark.range(10000).select(Gen.h(col("id"), 5, 10) as "v")
    val counts = df.groupBy("v").count().collect().map(_.getLong(1))
    assert(counts.length == 10)
    counts.foreach(c => assert(math.abs(c - 1000) < 200, s"bucket count $c"))
  }
}
