package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import repro.cfg.{CNF, CYK, Grammar}
import repro.graph.LabeledGraph

/** A string is a path graph: graph parsing must degenerate to classical
  * CNF recognition (the paper's CYK/Valiant heritage — Algorithm 1 on a
  * linear graph computes exactly the CYK table's span relation:
  * `A ∈ T[i][j]` iff A derives word[i, j)).
  */
class StringAsGraphSpec extends AnyFunSuite {

  private def pathGraph(word: Seq[String]): LabeledGraph =
    LabeledGraph(word.length + 1,
      word.zipWithIndex.map { case (x, i) => (i, x, i + 1) }.toVector)

  private val grammars = Seq(
    ("anbn", CNF.transform(Grammar.parse("S -> a S b | a b"))),
    ("brackets", CNF.transform(Grammar.parse("S -> S S | a S b | a b"))),
    ("ambiguous", CNF.transform(Grammar.parse("S -> S S | a"))),
  )

  for ((name, cnf) <- grammars) {
    test(s"[$name] whole-word acceptance: (0, n) ∈ R_S iff CYK accepts") {
      val rnd = new Random(name.hashCode)
      for (len <- 1 to 7; _ <- 1 to 3) {
        val word = Seq.fill(len)(if (rnd.nextBoolean()) "a" else "b")
        val g = pathGraph(word)
        val accepted = SparseCFPQ.solve(g, cnf)("S").contains((0, len))
        assert(accepted == CYK.accepts(cnf, "S", word), word.mkString)
      }
    }

    test(s"[$name] full span relation equals the CYK parse table") {
      val rnd = new Random(31 + name.hashCode)
      val word = Seq.fill(6)(if (rnd.nextBoolean()) "a" else "b")
      val table = CYK.parseTable(cnf, word)
      val result = SparseCFPQ.solve(pathGraph(word), cnf)
      for (i <- 0 until word.length; j <- (i + 1) to word.length; a <- cnf.nonterminals) {
        assert(result(a).contains((i, j)) == table(i)(j).contains(a),
          s"span [$i,$j) nt=$a word=${word.mkString}")
      }
    }
  }

  test("Algorithm 1 on a path graph needs exactly derivation-height iterations (paper Lemma 1)") {
    // The CNF of S → a S b | a b derives a^n b^n with a height-2n tree
    // (each nesting level adds a chain rule plus a binarization link).
    // By Lemma 1, (0,16) for a^8 b^8 (height 16) first appears in b^(16);
    // since T_i = b^(i+1) (T_0 is the initialized matrix = b^(1)), the
    // last productive loop iteration is 15 and iteration 16 detects the
    // fixpoint — 16 iterations total, one per derivation-height level.
    // This is why the naive closure is iteration-hungry (§6.1 of DESIGN.md).
    val cnf = CNF.transform(Grammar.parse("S -> a S b | a b"))
    val word = Seq.fill(8)("a") ++ Seq.fill(8)("b")
    val r = SparseCFPQ.solve(pathGraph(word), cnf)
    assert(r("S").contains((0, 16)))
    assert(r.iterations == 16, s"iterations=${r.iterations}")
  }
}
