package repro.cfg

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class CNFSpec extends AnyFunSuite {

  /** All words over `alphabet` with length in [1, maxLen]. */
  private def words(alphabet: Seq[String], maxLen: Int): Seq[Seq[String]] =
    (1 to maxLen).flatMap { len =>
      Seq.fill(len)(alphabet).foldLeft(Seq(Seq.empty[String]))((acc, cs) =>
        acc.flatMap(p => cs.map(p :+ _)))
    }

  /** Membership must agree between Earley(original) and CYK(CNF) for every
    * nonterminal of the original grammar and every word up to the bound.
    * (ε is excluded: the paper's CNF drops ε by construction.)
    */
  private def assertLanguagePreserved(g: Grammar, maxLen: Int, nts: Option[Set[String]] = None): Unit = {
    val cnf = CNF.transform(g)
    val alphabet = g.terminals.toSeq.sorted
    val checkNts = nts.getOrElse(g.productions.map(_.lhs).toSet)
    for (nt <- checkNts; w <- words(alphabet, maxLen)) {
      val orig = Earley.accepts(g, nt, w)
      val viaCnf = CYK.accepts(cnf, nt, w)
      assert(orig == viaCnf, s"nt=$nt word=${w.mkString(" ")} orig=$orig cnf=$viaCnf\nCNF:\n$cnf")
    }
  }

  test("CNF output shape: only A->BC and A->x rules (enforced by type)") {
    val cnf = CNF.transform(Grammar.parse("S -> a S b b | a b | S S"))
    assert(cnf.binary.forall { case (a, b, c) =>
      cnf.nonterminals(a) && cnf.nonterminals(b) && cnf.nonterminals(c) })
    assert(cnf.term.forall { case (_, x) => cnf.terminals(x) })
  }

  test("already-CNF grammar is preserved up to rule set equality") {
    val g = Grammar.parse("S -> A B", "A -> a", "B -> b")
    val cnf = CNF.transform(g)
    assert(cnf.binary.toSet == Set(("S", "A", "B")))
    assert(cnf.term.toSet == Set(("A", "a"), ("B", "b")))
  }

  test("TERM: terminals in long bodies are lifted") {
    val cnf = CNF.transform(Grammar.parse("S -> a S | b"))
    // S -> a S becomes S -> T_a S with T_a -> a
    assert(cnf.binary.size == 1)
    val (s, ta, s2) = cnf.binary.head
    assert(s == "S" && s2 == "S")
    assert(cnf.term.contains((ta, "a")))
    assert(cnf.term.contains(("S", "b")))
  }

  test("BIN: length-4 body becomes a chain of three binary rules") {
    val cnf = CNF.transform(Grammar.parse("S -> a b c d"))
    assert(cnf.binary.size == 3)
    assert(cnf.term.size == 4)
    assertLanguagePreserved(Grammar.parse("S -> a b c d"), maxLen = 4)
  }

  test("UNIT: chains A->B->C->x are collapsed") {
    val g = Grammar.parse("S -> A", "A -> B", "B -> x | y S y")
    val cnf = CNF.transform(g)
    assert(cnf.term.contains(("S", "x")))
    assert(cnf.term.contains(("A", "x")))
    assert(cnf.term.contains(("B", "x")))
    assertLanguagePreserved(g, maxLen = 5)
  }

  test("UNIT: cyclic unit rules do not loop") {
    val g = Grammar.parse("S -> A | x", "A -> S | y")
    val cnf = CNF.transform(g)
    assert(cnf.term.toSet.intersect(Set(("S", "x"), ("S", "y"), ("A", "x"), ("A", "y"))).size == 4)
  }

  test("DEL: nullable symbols are expanded away") {
    val g = Grammar.parse("S -> A b A", "A -> a | eps")
    assertLanguagePreserved(g, maxLen = 4)
    // b alone must be accepted (both A's erased)
    val cnf = CNF.transform(g)
    assert(CYK.accepts(cnf, "S", Seq("b")))
    assert(CYK.accepts(cnf, "S", Seq("a", "b")))
    assert(CYK.accepts(cnf, "S", Seq("b", "a")))
    assert(CYK.accepts(cnf, "S", Seq("a", "b", "a")))
    assert(!CYK.accepts(cnf, "S", Seq("a", "a", "b")))
  }

  test("nullable computation: direct and transitive") {
    val g = Grammar.parse("S -> A B", "A -> eps", "B -> A A | b")
    assert(CNF.nullable(g.productions) == Set("S", "A", "B"))
  }

  test("fresh names never collide with existing nonterminals") {
    // User grammar already uses the names the transformer would generate.
    val g = Grammar.parse("S -> a S b | a b", "T_a -> a S b", "B_S -> a")
    val cnf = CNF.transform(g)
    // All rules well-formed and language preserved for S.
    assertLanguagePreserved(g, maxLen = 4, nts = Some(Set("S")))
    assert(cnf.nonterminals.size == cnf.nonterminals.toSeq.distinct.size)
  }

  test("Q1: our CNF is language-equivalent to the paper's Fig. 4 CNF") {
    val ours = Queries.q1Cnf
    val paper = Queries.q1CnfPaper
    val alphabet = Queries.q1.terminals.toSeq.sorted
    for (w <- words(alphabet, 4)) {
      assert(CYK.accepts(ours, "S", w) == CYK.accepts(paper, "S", w), w.mkString(" "))
    }
  }

  test("Q1: CNF preserves the original language (Earley vs CYK)") {
    assertLanguagePreserved(Queries.q1, maxLen = 4, nts = Some(Set("S")))
  }

  test("Q2: CNF preserves the original language (Earley vs CYK)") {
    assertLanguagePreserved(Queries.q2, maxLen = 5)
  }

  test("a^n b^n: CNF preserves language") {
    assertLanguagePreserved(Grammar.parse("S -> a S b | a b"), maxLen = 6)
  }

  test("brackets: CNF preserves language") {
    assertLanguagePreserved(Grammar.parse("S -> S S | [ S ] | [ ]"), maxLen = 6)
  }

  test("palindromes: CNF preserves language") {
    assertLanguagePreserved(Grammar.parse("S -> a S a | b S b | a a | b b | a | b"), maxLen = 5)
  }

  // ------------------------------------------------------------------
  // Randomized language-preservation property: random ε-free grammars.
  // ------------------------------------------------------------------
  private def randomGrammar(rnd: Random): Grammar = {
    val nts = Seq("S", "A", "B").take(2 + rnd.nextInt(2))
    val terms = Seq("a", "b")
    val prods = (1 to 2 + rnd.nextInt(5)).map { _ =>
      val lhs = nts(rnd.nextInt(nts.length))
      val len = 1 + rnd.nextInt(3)
      val rhs = Seq.fill(len) {
        if (rnd.nextBoolean()) N(nts(rnd.nextInt(nts.length)))
        else T(terms(rnd.nextInt(terms.length)))
      }
      Production(lhs, rhs)
    }
    // Guarantee at least one terminal production so the CNF is non-degenerate.
    Grammar(prods :+ Production(nts.head, Seq(T("a"))))
  }

  for (i <- 0 until 30) {
    test(s"random ε-free grammar #$i: CNF preserves language up to length 5") {
      val g = randomGrammar(new Random(9000 + i))
      assertLanguagePreserved(g, maxLen = 5)
    }
  }

  for (i <- 0 until 10) {
    test(s"random grammar with ε-rules #$i: CNF preserves nonempty words up to length 4") {
      val rnd = new Random(7000 + i)
      val base = randomGrammar(rnd)
      val g = Grammar(base.productions :+
        Production(base.productions(rnd.nextInt(base.productions.size)).lhs, Seq.empty))
      assertLanguagePreserved(g, maxLen = 4)
    }
  }
}
