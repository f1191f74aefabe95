package repro.cfg

import org.scalatest.funsuite.AnyFunSuite

class EarleySpec extends AnyFunSuite {

  private val anbn = Grammar.parse("S -> a S b | a b")
  private val brackets = Grammar.parse("S -> S S | [ S ] | [ ]")
  private val palindrome = Grammar.parse("S -> a S a | b S b | a a | b b | a | b")
  private val withEps = Grammar.parse("S -> a S b | eps")
  private val sameGen = Queries.q1

  test("a^n b^n accepts ab, aabb, aaabbb") {
    for (n <- 1 to 5)
      assert(Earley.accepts(anbn, "S", Seq.fill(n)("a") ++ Seq.fill(n)("b")), s"n=$n")
  }

  test("a^n b^n rejects unbalanced and shuffled words") {
    assert(!Earley.accepts(anbn, "S", Seq("a")))
    assert(!Earley.accepts(anbn, "S", Seq("b", "a")))
    assert(!Earley.accepts(anbn, "S", Seq("a", "a", "b")))
    assert(!Earley.accepts(anbn, "S", Seq("a", "b", "a", "b")))
    assert(!Earley.accepts(anbn, "S", Seq.empty))
  }

  test("balanced brackets accepts nested and concatenated words") {
    assert(Earley.accepts(brackets, "S", Seq("[", "]")))
    assert(Earley.accepts(brackets, "S", Seq("[", "[", "]", "]")))
    assert(Earley.accepts(brackets, "S", Seq("[", "]", "[", "]")))
    assert(Earley.accepts(brackets, "S", Seq("[", "[", "]", "[", "]", "]")))
  }

  test("balanced brackets rejects ill-formed words") {
    assert(!Earley.accepts(brackets, "S", Seq("[")))
    assert(!Earley.accepts(brackets, "S", Seq("]", "[")))
    assert(!Earley.accepts(brackets, "S", Seq("[", "]", "]")))
  }

  test("palindromes over {a,b}") {
    assert(Earley.accepts(palindrome, "S", Seq("a", "b", "a")))
    assert(Earley.accepts(palindrome, "S", Seq("a", "b", "b", "a")))
    assert(!Earley.accepts(palindrome, "S", Seq("a", "b")))
    assert(!Earley.accepts(palindrome, "S", Seq("a", "a", "b")))
  }

  test("epsilon rules: S -> a S b | eps accepts empty word and a^n b^n") {
    assert(Earley.accepts(withEps, "S", Seq.empty))
    assert(Earley.accepts(withEps, "S", Seq("a", "b")))
    assert(Earley.accepts(withEps, "S", Seq("a", "a", "b", "b")))
    assert(!Earley.accepts(withEps, "S", Seq("a")))
  }

  test("nullable-in-the-middle grammar (tests immediate completion)") {
    // S -> A S b | c ;  A -> eps | a   — A nullable before recursion.
    val g = Grammar.parse("S -> A S b | c", "A -> eps | a")
    assert(Earley.accepts(g, "S", Seq("c")))
    assert(Earley.accepts(g, "S", Seq("c", "b")))          // A→ε
    assert(Earley.accepts(g, "S", Seq("a", "c", "b")))
    assert(Earley.accepts(g, "S", Seq("a", "c", "b", "b")))
    assert(!Earley.accepts(g, "S", Seq("b")))
  }

  test("same-generation query grammar: even-length matched words") {
    val (sr, s, tr, t) = ("subClassOf_r", "subClassOf", "type_r", "type")
    assert(Earley.accepts(sameGen, "S", Seq(sr, s)))
    assert(Earley.accepts(sameGen, "S", Seq(tr, t)))
    assert(Earley.accepts(sameGen, "S", Seq(sr, tr, t, s)))
    assert(Earley.accepts(sameGen, "S", Seq(tr, sr, s, t)))
    assert(!Earley.accepts(sameGen, "S", Seq(sr, t)))
    assert(!Earley.accepts(sameGen, "S", Seq(s, sr)))
    assert(!Earley.accepts(sameGen, "S", Seq(sr, sr, s)))
  }

  test("language enumeration matches hand-computed small language") {
    val lang = Earley.language(anbn, "S", Seq("a", "b"), maxLen = 6)
    assert(lang == Set(
      Seq("a", "b"),
      Seq("a", "a", "b", "b"),
      Seq("a", "a", "a", "b", "b", "b"),
    ))
  }

  test("start symbol with no productions accepts nothing") {
    assert(!Earley.accepts(anbn, "Z", Seq("a", "b")))
  }
}
