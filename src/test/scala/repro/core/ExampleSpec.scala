package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.baseline.{GllCFPQ, HellingsCFPQ}
import repro.cfg.Queries
import repro.graph.LabeledGraph
import repro.SparkSpec

/** The paper's worked example (§4.3): the 3-node graph of Fig. 5 with the
  * CNF grammar of Fig. 4, checked step-by-step against Figures 6–9.
  */
class ExampleSpec extends AnyFunSuite {

  private val g = LabeledGraph.paperExample
  private val cnf = Queries.exampleCnf
  private def S(names: String*) = names.toSet

  // Matrices exactly as printed in the paper (rows 0..2 × cols 0..2).
  private val t0 = Vector(
    Vector(S("S1"), S("S3"), S()),
    Vector(S(), S(), S("S3")),
    Vector(S("S2"), S(), S("S4")),
  )
  private val t1 = Vector(
    Vector(S("S1"), S("S3"), S()),
    Vector(S(), S(), S("S3", "S")),
    Vector(S("S2"), S(), S("S4")),
  )
  private val t2 = Vector(
    Vector(S("S1"), S("S3"), S()),
    Vector(S("S5"), S(), S("S3", "S", "S6")),
    Vector(S("S2"), S(), S("S4")),
  )
  private val t3 = Vector(
    Vector(S("S1"), S("S3"), S("S")),
    Vector(S("S5"), S(), S("S3", "S", "S6")),
    Vector(S("S2"), S(), S("S4")),
  )
  private val t4 = Vector(
    Vector(S("S1", "S5"), S("S3"), S("S", "S6")),
    Vector(S("S5"), S(), S("S3", "S", "S6")),
    Vector(S("S2"), S(), S("S4")),
  )
  private val t5 = Vector(
    Vector(S("S1", "S5", "S"), S("S3"), S("S", "S6")),
    Vector(S("S5"), S(), S("S3", "S", "S6")),
    Vector(S("S2"), S(), S("S4")),
  )

  // Fig. 9: the resulting context-free relations.
  private val fig9: Map[String, Set[(Int, Int)]] = Map(
    "S"  -> Set((0, 0), (0, 2), (1, 2)),
    "S1" -> Set((0, 0)),
    "S2" -> Set((2, 0)),
    "S3" -> Set((0, 1), (1, 2)),
    "S4" -> Set((2, 2)),
    "S5" -> Set((0, 0), (1, 0)),
    "S6" -> Set((0, 2), (1, 2)),
  )

  test("Fig. 6: matrix initialization produces T0") {
    assert(NaiveSetMatrixCFPQ.initial(g, cnf) == t0)
  }

  test("Figs. 7-8: the closure steps produce T1…T5 exactly") {
    val steps = NaiveSetMatrixCFPQ.steps(g, cnf).take(7).toVector
    assert(steps(1) == t1, "T1")
    assert(steps(2) == t2, "T2")
    assert(steps(3) == t3, "T3")
    assert(steps(4) == t4, "T4")
    assert(steps(5) == t5, "T5")
  }

  test("the closure stabilizes at iteration 6 (T6 = T5), as in the paper") {
    val steps = NaiveSetMatrixCFPQ.steps(g, cnf).take(7).toVector
    assert(steps(6) == steps(5))
    assert(steps(4) != steps(5))
    assert(NaiveSetMatrixCFPQ.solve(g, cnf).iterations == 6)
  }

  test("Fig. 9: NaiveSetMatrix relations") {
    assert(NaiveSetMatrixCFPQ.solve(g, cnf).relations == fig9)
  }

  test("Fig. 9: Dense engine relations (empty relations omitted)") {
    val got = DenseCFPQ.solve(g, cnf)
    assert(got.relations.filter(_._2.nonEmpty) == fig9)
    assert(got.iterations == 6)
  }

  test("Fig. 9: SparseCSR engine relations") {
    val got = SparseCFPQ.solve(g, cnf)
    assert(got.relations.filter(_._2.nonEmpty) == fig9)
    assert(got.iterations == 6)
  }

  test("Fig. 9: Hellings baseline relations") {
    assert(HellingsCFPQ.solve(g, cnf).relations == fig9)
  }

  test("Fig. 9: GLL baseline computes R_S on the original (non-CNF) grammar") {
    val gll = new GllCFPQ(Queries.q1, "S")
    assert(gll.solve(g)("S") == fig9("S"))
  }

  test("R_S means: paths 0→0, 0→2, 1→2 and no others match the query") {
    val rs = SparseCFPQ.solve(g, cnf)("S")
    assert(rs == Set((0, 0), (0, 2), (1, 2)))
  }
}

/** Spark engines on the same worked example (kept separate so the pure
  * JVM part of ExampleSpec does not need a session).
  */
class ExampleSparkSpec extends SparkSpec {
  private val g = LabeledGraph.paperExample
  private val cnf = Queries.exampleCnf
  private val fig9S = Set((0, 0), (0, 2), (1, 2))

  test("Fig. 9: SparkDataFrame engine matches, iterations = 6") {
    val got = new SparkDataFrameCFPQ(spark).solve(g, cnf)
    assert(got("S") == fig9S)
    assert(got.iterations == 6)
    assert(got("S5") == Set((0, 0), (1, 0)))
  }

  test("Fig. 9: SparkBlock engine matches, iterations = 6") {
    val got = new SparkBlockCFPQ(spark, blockSize = 2).solve(g, cnf)
    assert(got("S") == fig9S)
    assert(got.iterations == 6)
    assert(got("S6") == Set((0, 2), (1, 2)))
  }
}
