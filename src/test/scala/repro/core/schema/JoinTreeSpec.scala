package repro.core.schema

import org.scalatest.funsuite.AnyFunSuite

class JoinTreeSpec extends AnyFunSuite {

  // A(a,b) — B(b,c) — C(c,d), with D(b,e) hanging off B.
  private def diamondless: JoinTree = JoinTree(
    Seq(
      Relation("A", Seq("a", "b")),
      Relation("B", Seq("b", "c")),
      Relation("C", Seq("c", "d")),
      Relation("D", Seq("b", "e")),
    ),
    Seq(("A", "B"), ("B", "C"), ("B", "D")),
    sizes = Map("A" -> 100L, "B" -> 10L, "C" -> 5L, "D" -> 7L),
  )

  test("valid tree constructs") {
    val t = diamondless
    assert(t.relations.size == 4)
  }

  test("neighbors are symmetric") {
    val t = diamondless
    assert(t.neighbors("A") == Seq("B"))
    assert(t.neighbors("B").toSet == Set("A", "C", "D"))
  }

  test("joinKeys returns shared attributes in first relation's order") {
    val t = diamondless
    assert(t.joinKeys("A", "B") == Seq("b"))
    assert(t.joinKeys("B", "C") == Seq("c"))
  }

  test("owner picks the first relation in schema order") {
    val t = diamondless
    assert(t.owner("a") == "A")
    assert(t.owner("b") == "A") // A comes before B and D
    assert(t.owner("c") == "B")
    assert(t.owner("d") == "C")
    assert(t.owner("e") == "D")
  }

  test("allAttrs is the union of relation attributes") {
    assert(diamondless.allAttrs == Set("a", "b", "c", "d", "e"))
  }

  test("subtreeNodes cuts exactly one edge") {
    val t = diamondless
    assert(t.subtreeNodes("B", "A") == Set("B", "C", "D"))
    assert(t.subtreeNodes("A", "B") == Set("A"))
    assert(t.subtreeNodes("C", "B") == Set("C"))
  }

  test("subtreeAttrs is the union over subtree nodes") {
    val t = diamondless
    assert(t.subtreeAttrs("B", "A") == Set("b", "c", "d", "e"))
    assert(t.subtreeAttrs("A", "B") == Set("a", "b"))
  }

  test("bottomUpEdges visits children before parents") {
    val t = diamondless
    val edges = t.bottomUpEdges("A")
    assert(edges.toSet == Set(("C", "B"), ("D", "B"), ("B", "A")))
    assert(edges.indexOf(("C", "B")) < edges.indexOf(("B", "A")))
    assert(edges.indexOf(("D", "B")) < edges.indexOf(("B", "A")))
  }

  test("bottomUpEdges from a leaf root") {
    val t = diamondless
    val edges = t.bottomUpEdges("C")
    assert(edges.toSet == Set(("A", "B"), ("D", "B"), ("B", "C")))
    assert(edges.last == (("B", "C")))
  }

  test("parentToward follows the path to the root") {
    val t = diamondless
    assert(t.parentToward("C", "A") == "B")
    assert(t.parentToward("A", "C") == "B")
    assert(t.parentToward("D", "A") == "B")
  }

  test("parentToward rejects the root itself") {
    assertThrows[IllegalArgumentException](diamondless.parentToward("A", "A"))
  }

  test("childrenToward at the root lists all neighbors") {
    val t = diamondless
    assert(t.childrenToward("B", "B").toSet == Set("A", "C", "D"))
  }

  test("childrenToward away from the root excludes the parent") {
    val t = diamondless
    assert(t.childrenToward("B", "A").toSet == Set("C", "D"))
    assert(t.childrenToward("C", "A").isEmpty)
  }

  test("sizeOf falls back to 1 for unknown relations") {
    assert(diamondless.sizeOf("A") == 100L)
    assert(JoinTree(Seq(Relation("X", Seq("x"))), Nil).sizeOf("X") == 1L)
  }

  test("single-relation tree is valid") {
    val t = JoinTree(Seq(Relation("X", Seq("x", "y"))), Nil)
    assert(t.bottomUpEdges("X").isEmpty)
  }

  test("disconnected graph is rejected") {
    assertThrows[IllegalArgumentException] {
      JoinTree(
        Seq(Relation("A", Seq("a", "b")), Relation("B", Seq("b")), Relation("C", Seq("c"))),
        Seq(("A", "B"), ("A", "B")), // duplicate edge leaves C unreachable
      )
    }
  }

  test("edge without shared attributes is rejected") {
    assertThrows[IllegalArgumentException] {
      JoinTree(Seq(Relation("A", Seq("a")), Relation("B", Seq("b"))), Seq(("A", "B")))
    }
  }

  test("wrong edge count is rejected") {
    assertThrows[IllegalArgumentException] {
      JoinTree(Seq(Relation("A", Seq("a", "b")), Relation("B", Seq("b"))), Nil)
    }
  }

  test("self edge is rejected") {
    assertThrows[IllegalArgumentException] {
      JoinTree(Seq(Relation("A", Seq("a")), Relation("B", Seq("a"))), Seq(("A", "A")))
    }
  }

  test("edge to unknown relation is rejected") {
    assertThrows[IllegalArgumentException] {
      JoinTree(Seq(Relation("A", Seq("a")), Relation("B", Seq("a"))), Seq(("A", "Z")))
    }
  }

  test("running intersection violation is rejected") {
    // attribute x in A and C but not in B, with A—B—C a chain
    assertThrows[IllegalArgumentException] {
      JoinTree(
        Seq(Relation("A", Seq("x", "b")), Relation("B", Seq("b", "c")), Relation("C", Seq("c", "x"))),
        Seq(("A", "B"), ("B", "C")),
      )
    }
  }

  test("duplicate relation names are rejected") {
    assertThrows[IllegalArgumentException] {
      JoinTree(Seq(Relation("A", Seq("a")), Relation("A", Seq("a"))), Seq(("A", "A")))
    }
  }

  test("the Favorita and Retailer trees validate") {
    assert(repro.data.Favorita.tree(0.01).relations.size == 6)
    assert(repro.data.Retailer.tree(0.01).relations.size == 5)
  }
}
