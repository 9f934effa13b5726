package repro.core.group

import org.scalatest.funsuite.AnyFunSuite

import repro.core.query.{AggQuery, Measure}
import repro.core.schema.{JoinTree, Relation}
import repro.core.viewgen.ViewGeneration
import repro.data.Favorita

class DependencyGraphSpec extends AnyFunSuite {

  private val fav = Favorita.tree(0.01)
  private val demoPlan = ViewGeneration.plan(fav, Favorita.demoQueries)

  test("every view and output lands in exactly one group") {
    val gs = DependencyGraph.groups(demoPlan)
    assert(gs.flatMap(_.views).map(_.id).sorted(Ordering.by((v: repro.core.viewgen.ViewId) => v.label)) ==
      demoPlan.views.map(_.id).sortBy(_.label))
    assert(gs.flatMap(_.outputs).map(_.query.name).sorted == demoPlan.outputs.map(_.query.name).sorted)
  }

  test("groups are keyed by node and direction") {
    val gs = DependencyGraph.groups(demoPlan)
    gs.foreach { g =>
      g.views.foreach(v => assert(v.id.from == g.node && g.direction.contains(v.id.to)))
      g.outputs.foreach(o => assert(o.root == g.node && g.direction.isEmpty))
    }
  }

  test("the demo batch forms 8 groups (paper merges to 7 via in-group lookups)") {
    // 6 directional view groups + Sales outputs (Q1,Q2) + Items outputs (Q3).
    val gs = DependencyGraph.groups(demoPlan)
    assert(gs.size == 8)
    assert(gs.count(_.direction.isEmpty) == 2)
  }

  test("Q1 and Q2 share one multi-output group at Sales") {
    val gs = DependencyGraph.groups(demoPlan)
    val salesOut = gs.filter(g => g.node == "Sales" && g.direction.isEmpty)
    assert(salesOut.size == 1)
    assert(salesOut.head.outputs.map(_.query.name).toSet == Set("Q1", "Q2"))
  }

  test("group order satisfies dependencies") {
    val gs = DependencyGraph.groups(demoPlan)
    val produced = scala.collection.mutable.Set.empty[repro.core.viewgen.ViewId]
    gs.foreach { g =>
      g.incoming.foreach(dep => assert(produced.contains(dep), s"group ${g.label} before its input ${dep.label}"))
      produced ++= g.produced
    }
  }

  test("group members share the same incoming view set") {
    // Construct a case with different key sets on one edge: one query carries
    // a group-by attribute, the other does not.
    val chain = JoinTree(
      Seq(Relation("A", Seq("a", "b")), Relation("B", Seq("b", "c")), Relation("C", Seq("c", "d"))),
      Seq(("A", "B"), ("B", "C")))
    val q1 = AggQuery("q1", Nil, Seq(Measure.count("c1")))
    val q2 = AggQuery("q2", Seq("d"), Seq(Measure.count("c2")))
    val plan = ViewGeneration.plan(chain, Seq(q1, q2), Map("q1" -> "A", "q2" -> "A"))
    val gs = DependencyGraph.groups(plan)
    // Edge B->A hosts two merged views with different incoming sets -> 2 groups.
    assert(gs.count(g => g.node == "B" && g.direction.contains("A")) == 2)
    gs.foreach { g =>
      val sets = (g.views.map(_.incoming.toSet) ++ g.outputs.map(_.incoming.toSet)).distinct
      assert(sets.size == 1)
    }
  }

  test("edges expose producer-consumer pairs") {
    val gs = DependencyGraph.groups(demoPlan)
    val es = DependencyGraph.edges(gs)
    es.foreach { case (producer, consumer) =>
      assert(consumer.incoming.exists(producer.produced.contains))
    }
    // Q3's group at Items consumes the Sales->Items view group.
    val itemsOut = gs.find(g => g.node == "Items" && g.direction.isEmpty).get
    assert(es.exists { case (p, c) => c == itemsOut && p.node == "Sales" && p.direction.contains("Items") })
  }

  test("groups at a leaf relation have no incoming views") {
    val gs = DependencyGraph.groups(demoPlan)
    val leafGroups = gs.filter(g => Set("Stores", "Oil", "Holidays", "Items").contains(g.node) && g.direction.nonEmpty)
    leafGroups.foreach(g => assert(g.incoming.isEmpty))
  }

  test("directional groups never contain outputs and vice versa") {
    val gs = DependencyGraph.groups(demoPlan)
    gs.foreach { g =>
      if (g.direction.nonEmpty) assert(g.outputs.isEmpty) else assert(g.views.isEmpty)
    }
  }
}
