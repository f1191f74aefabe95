package repro.data

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.LabeledGraph

class OntologyGenSpec extends AnyFunSuite {

  private def triplesOf(g: LabeledGraph): Vector[(Int, String, Int)] = g.edges

  test("triple count is exactly (C-1) + I + extra") {
    for ((c, i, e) <- Seq((10, 20, 5), (1, 0, 0), (50, 120, 83), (2, 1, 100))) {
      val g = OntologyGen.ontology(c, i, e, layers = 3, seed = 1L)
      assert(triplesOf(g).size == (c - 1) + i + e, s"C=$c I=$i E=$e")
    }
  }

  test("triple count stays exact with every knob combination") {
    for {
      mp <- Seq(0.0, 0.5, 1.0)
      mt <- Seq(0.0, 0.5).filter(_ + mp <= 1.0)
      tpi <- Seq(1.0, 7.5)
      ctf <- Seq(0.0, 0.9)
    } {
      val g = OntologyGen.ontology(40, 100, 60, 4, mp, mt, 2.0, tpi, ctf, seed = 2L)
      assert(triplesOf(g).size == 39 + 100 + 60, s"mp=$mp mt=$mt tpi=$tpi ctf=$ctf")
    }
  }

  test("deterministic in seed") {
    val a = OntologyGen.ontology(30, 50, 20, 4, seed = 7L)
    val b = OntologyGen.ontology(30, 50, 20, 4, seed = 7L)
    val c = OntologyGen.ontology(30, 50, 20, 4, seed = 8L)
    assert(a == b)
    assert(a != c)
  }

  test("hierarchy is layered: every subClassOf edge goes exactly one layer up") {
    val layers = 5
    val c = 41
    val g = OntologyGen.ontology(c, 0, 30, layers, multiParentFrac = 1.0,
      multiTypeFrac = 0.0, seed = 3L)
    def layerOf(i: Int): Int = if (i == 0) 0 else 1 + (i - 1) % layers
    g.byLabel("subClassOf").foreach { case (child, parent) =>
      assert(layerOf(child) == layerOf(parent) + 1, s"$child -> $parent")
    }
  }

  test("the subClassOf skeleton reaches the root from every class") {
    val g = OntologyGen.ontology(50, 0, 0, 4, seed = 4L)
    val parents = g.byLabel("subClassOf").groupBy(_._1)
    for (cls <- 1 until 50) {
      var cur = cls
      var hops = 0
      while (cur != 0 && hops < 100) { cur = parents(cur).head._2; hops += 1 }
      assert(cur == 0, s"class $cls does not reach the root")
    }
  }

  test("typesPerInst shrinks the instance pool, keeping the type-triple count") {
    val g1 = OntologyGen.ontology(20, 100, 0, 3, typesPerInst = 1.0, seed = 5L)
    val g4 = OntologyGen.ontology(20, 100, 0, 3, typesPerInst = 4.0, seed = 5L)
    assert(g1.byLabel.getOrElse("type", Vector.empty).size <= 100) // dedup may collapse a few
    assert(g1.numNodes == 20 + 100)
    assert(g4.numNodes == 20 + 25)
    assert(g4.edges.count(_._2 == "type") == 100)
  }

  test("type triples point from instances (or classes when ctf > 0) to classes") {
    val c = 25
    val g = OntologyGen.ontology(c, 60, 40, 3, multiParentFrac = 0.0,
      multiTypeFrac = 1.0, classTypeFrac = 0.5, seed = 6L)
    g.edges.filter(_._2 == "type").foreach { case (_, _, target) =>
      assert(target < c, "type target must be a class")
    }
  }

  test("classTypeFrac = 0 keeps all type subjects in the instance pool") {
    val c = 25
    val g = OntologyGen.ontology(c, 60, 40, 3, multiParentFrac = 0.0,
      multiTypeFrac = 1.0, classTypeFrac = 0.0, seed = 6L)
    g.edges.filter(_._2 == "type").foreach { case (subj, _, _) =>
      assert(subj >= c, "type subject must be an instance when ctf = 0")
    }
  }

  test("other-labeled padding is outside the query alphabet") {
    val g = OntologyGen.ontology(10, 10, 50, 3, multiParentFrac = 0.0,
      multiTypeFrac = 0.0, seed = 9L)
    assert(g.edges.count(_._2 == OntologyGen.Other) == 50)
    assert(!Set("subClassOf", "type").contains(OntologyGen.Other))
  }

  test("degenerate: single class, no instances — all extra becomes padding") {
    val g = OntologyGen.ontology(1, 0, 10, 3, multiParentFrac = 0.8,
      multiTypeFrac = 0.1, seed = 10L)
    assert(g.edges.size == 10)
    assert(g.edges.forall(_._2 == OntologyGen.Other))
  }
}
