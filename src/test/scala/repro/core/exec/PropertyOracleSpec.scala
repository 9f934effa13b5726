package repro.core.exec

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

import repro.{Check, SparkSpec, TestData}
import repro.core.query._

/** Property-based oracle testing: random group-by aggregate queries with
  * random roots over the chain and star schemas, every result diffed against
  * DuckDB. (ScalaCheck generators driven manually with fixed seeds — the
  * scalatest/scalacheck bridge artifact is not available offline.)
  */
class PropertyOracleSpec extends SparkSpec {

  private lazy val (chainTree, chainTables) = TestData.chain(spark)
  private lazy val (starTree, starTables) = TestData.star(spark)

  private val Cases = 12

  private def sample[A](gen: Gen[A], seed: Long): A =
    gen.pureApply(Gen.Parameters.default, Seed(seed))

  private val fnGen: Gen[ScalarFn] =
    Gen.oneOf(ScalarFn.Identity, ScalarFn.Square, ScalarFn.G, ScalarFn.H)

  private def measureGen(attrs: Seq[String], idx: Int): Gen[Measure] =
    for {
      nf <- Gen.choose(0, 3)
      factors <- Gen.listOfN(nf, for { a <- Gen.oneOf(attrs); f <- fnGen } yield Factor(a, f))
    } yield Measure(s"m$idx", factors)

  private def queryGen(attrs: Seq[String], roots: Seq[String]): Gen[(AggQuery, String)] =
    for {
      nGb <- Gen.choose(0, 2)
      gb <- Gen.pick(nGb, attrs)
      nM <- Gen.choose(1, 2)
      measures <- Gen.sequence[Seq[Measure], Measure]((0 until nM).map(i => measureGen(attrs, i)))
      root <- Gen.oneOf(roots)
    } yield (AggQuery("q", gb.toSeq.sorted, measures), root)

  test("random queries over the chain match DuckDB at every root") {
    val gen = queryGen(Seq("a", "b", "c", "d"), Seq("A", "B", "C"))
    (1 to Cases).foreach { i =>
      val (query, root) = sample(gen, 1000 + i)
      withClue(s"seed=${1000 + i} query=$query root=$root") {
        Check.lmfaoVsDuck(chainTree, chainTables, Seq(query), Map("q" -> root))
      }
    }
  }

  test("random queries over the star match DuckDB at every root") {
    val gen = queryGen(Seq("k1", "k2", "x", "u", "v"), Seq("S", "D1", "D2"))
    (1 to Cases).foreach { i =>
      val (query, root) = sample(gen, 2000 + i)
      withClue(s"seed=${2000 + i} query=$query root=$root") {
        Check.lmfaoVsDuck(starTree, starTables, Seq(query), Map("q" -> root))
      }
    }
  }

  test("random filtered queries over the chain match DuckDB") {
    val attrs = Seq("a", "b", "c", "d")
    val gen = for {
      (query, root) <- queryGen(attrs, Seq("A", "B", "C"))
      a <- Gen.oneOf(attrs)
      op <- Gen.oneOf(CmpOp.Le, CmpOp.Ge, CmpOp.Eq, CmpOp.Ne, CmpOp.Lt, CmpOp.Gt)
      v <- Gen.choose(1L, 8L)
    } yield (query.copy(filters = Seq(Predicate(a, op, v))), root)
    (1 to Cases).foreach { i =>
      val (query, root) = sample(gen, 3000 + i)
      withClue(s"seed=${3000 + i} query=$query root=$root") {
        Check.lmfaoVsDuck(chainTree, chainTables, Seq(query), Map("q" -> root))
      }
    }
  }

  test("random two-query batches share views and still match DuckDB") {
    val gen = for {
      (q1, r1) <- queryGen(Seq("a", "b", "c", "d"), Seq("A", "B", "C"))
      (q2, r2) <- queryGen(Seq("a", "b", "c", "d"), Seq("A", "B", "C"))
    } yield (q1.copy(name = "q1"), r1, q2.copy(name = "q2"), r2)
    (1 to Cases).foreach { i =>
      val (q1, r1, q2, r2) = sample(gen, 4000 + i)
      withClue(s"seed=${4000 + i} q1=$q1 q2=$q2") {
        Check.lmfaoVsDuck(chainTree, chainTables, Seq(q1, q2), Map("q1" -> r1, "q2" -> r2))
      }
    }
  }
}
