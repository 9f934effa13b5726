package repro

import org.apache.spark.sql.{DataFrame, SparkSession}

import repro.core.exec.LmfaoExec
import repro.core.query.{AggQuery, SqlRender}
import repro.core.schema.{JoinTree, Relation}
import repro.core.viewgen.ViewGeneration

/** Micro schemas for oracle tests: small enough that every DuckDB round-trip
  * is fast, with duplicate keys and dangling tuples so natural-join
  * multiplicity and inner-join semantics are actually exercised.
  */
object TestData {

  /** Chain A(a,b) — B(b,c) — C(c,d). B and C contain duplicate join keys. */
  def chain(spark: SparkSession, n: Int = 60, seed: Int = 1): (JoinTree, Map[String, DataFrame]) = {
    import spark.implicits._
    val rng = new scala.util.Random(seed)
    val aRows = Seq.fill(n)((rng.nextInt(9) + 1L, rng.nextInt(6) + 1L))        // (a, b)
    val bRows = Seq.fill(n / 2)((rng.nextInt(7) + 1L, rng.nextInt(5) + 1L))    // (b, c) with dups
    val cRows = Seq.fill(n / 3)((rng.nextInt(6) + 1L, rng.nextInt(9) + 1L))    // (c, d) with dups
    val tree = JoinTree(
      Seq(Relation("A", Seq("a", "b")), Relation("B", Seq("b", "c")), Relation("C", Seq("c", "d"))),
      Seq(("A", "B"), ("B", "C")),
      sizes = Map("A" -> n.toLong, "B" -> (n / 2).toLong, "C" -> (n / 3).toLong),
    )
    val tables = Map(
      "A" -> aRows.toDF("a", "b"),
      "B" -> bRows.toDF("b", "c"),
      "C" -> cRows.toDF("c", "d"),
    )
    (tree, tables)
  }

  /** Star S(k1,k2,x) — D1(k1,u), D2(k2,v); both dimensions have duplicate keys. */
  def star(spark: SparkSession, n: Int = 80, seed: Int = 2): (JoinTree, Map[String, DataFrame]) = {
    import spark.implicits._
    val rng = new scala.util.Random(seed)
    val sRows = Seq.fill(n)((rng.nextInt(5) + 1L, rng.nextInt(4) + 1L, rng.nextInt(20) + 1L))
    val d1Rows = Seq.fill(8)((rng.nextInt(6) + 1L, rng.nextInt(10) + 1L))
    val d2Rows = Seq.fill(6)((rng.nextInt(5) + 1L, rng.nextInt(10) + 1L))
    val tree = JoinTree(
      Seq(
        Relation("S", Seq("k1", "k2", "x")),
        Relation("D1", Seq("k1", "u")),
        Relation("D2", Seq("k2", "v")),
      ),
      Seq(("S", "D1"), ("S", "D2")),
      sizes = Map("S" -> n.toLong, "D1" -> 8L, "D2" -> 6L),
    )
    val tables = Map(
      "S" -> sRows.toDF("k1", "k2", "x"),
      "D1" -> d1Rows.toDF("k1", "u"),
      "D2" -> d2Rows.toDF("k2", "v"),
    )
    (tree, tables)
  }

  /** A single-relation "tree" R(g, x, y). */
  def single(spark: SparkSession, n: Int = 50, seed: Int = 3): (JoinTree, Map[String, DataFrame]) = {
    import spark.implicits._
    val rng = new scala.util.Random(seed)
    val rows = Seq.fill(n)((rng.nextInt(4) + 1L, rng.nextInt(10) + 1L, rng.nextInt(15) + 1L))
    val tree = JoinTree(Seq(Relation("R", Seq("g", "x", "y"))), Nil)
    (tree, Map("R" -> rows.toDF("g", "x", "y")))
  }

  /** Micro Favorita (~6k sales rows) for end-to-end oracle tests. */
  def favoritaMicro(spark: SparkSession): (JoinTree, Map[String, DataFrame]) =
    (repro.data.Favorita.tree(0.001), repro.data.Favorita.tables(spark, 0.001))

  /** Micro Retailer (~4.2k inventory rows). */
  def retailerMicro(spark: SparkSession): (JoinTree, Map[String, DataFrame]) =
    (repro.data.Retailer.tree(0.001), repro.data.Retailer.tables(spark, 0.001))
}

/** Oracle harness: run a batch through the LMFAO engine and check every query
  * result against DuckDB over the base relations.
  */
object Check {
  def lmfaoVsDuck(tree: JoinTree, tables: Map[String, DataFrame], queries: Seq[AggQuery],
                  roots: Map[String, String] = Map.empty): Unit = {
    val plan = ViewGeneration.plan(tree, queries, roots)
    val res = LmfaoExec.run(tables, plan)
    try {
      queries.foreach { q =>
        Oracle.assertEquivalent(res.queryResults(q.name), SqlRender.querySql(tree, q), tables.toSeq: _*)
      }
    } finally res.cleanup()
  }
}
