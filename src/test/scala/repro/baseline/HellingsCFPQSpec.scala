package repro.baseline

import org.scalatest.funsuite.AnyFunSuite
import repro.cfg.{CnfGrammar, CNF, Grammar, Queries}
import repro.graph.LabeledGraph

class HellingsCFPQSpec extends AnyFunSuite {

  private val anbn = CNF.transform(Grammar.parse("S -> a S b | a b"))

  test("balanced chain") {
    val g = LabeledGraph(5, Vector((0, "a", 1), (1, "a", 2), (2, "b", 3), (3, "b", 4)))
    assert(HellingsCFPQ.solve(g, anbn)("S") == Set((0, 4), (1, 3)))
  }

  test("worklist handles rules with A = C (self-composition)") {
    // S -> S S | a : popped S items must re-join against S itself.
    val cnf = CNF.transform(Grammar.parse("S -> S S | a"))
    val g = LabeledGraph(4, Vector((0, "a", 1), (1, "a", 2), (2, "a", 3)))
    assert(HellingsCFPQ.solve(g, cnf)("S") ==
      Set((0, 1), (1, 2), (2, 3), (0, 2), (1, 3), (0, 3)))
  }

  test("cyclic graph reaches the full closure") {
    val cnf = CNF.transform(Grammar.parse("S -> a S | a"))
    val g = LabeledGraph(3, Vector((0, "a", 1), (1, "a", 2), (2, "a", 0)))
    assert(HellingsCFPQ.solve(g, cnf)("S").size == 9)
  }

  test("both rule directions fire: late-arriving left operand") {
    // S -> A B; A discovered only via a longer derivation than B.
    val cnf = CnfGrammar(
      binary = Seq(("S", "A", "B"), ("A", "A", "A")),
      term = Seq(("A", "a"), ("B", "b")),
    )
    val g = LabeledGraph(4, Vector((0, "a", 1), (1, "a", 2), (2, "b", 3)))
    val r = HellingsCFPQ.solve(g, cnf)
    assert(r("A") == Set((0, 1), (1, 2), (0, 2)))
    assert(r("S") == Set((1, 3), (0, 3)))
  }

  test("iterations field is 1 (no closure iterations in a worklist algorithm)") {
    val g = LabeledGraph(2, Vector((0, "a", 1)))
    assert(HellingsCFPQ.solve(g, anbn).iterations == 1)
  }

  test("Q1 on the paper example equals Fig. 9") {
    val r = HellingsCFPQ.solve(LabeledGraph.paperExample, Queries.q1CnfPaper)
    assert(r("S") == Set((0, 0), (0, 2), (1, 2)))
  }
}
