package repro.cfg

import scala.collection.mutable

/** Transformation of an arbitrary context-free grammar into Chomsky normal
  * form, as required by the paper's Algorithm 1 (see §2 and §4.3).
  *
  * Stages (classic construction, minus the START stage — the paper's
  * grammars have no distinguished start symbol):
  *
  *   1. DEL  — eliminate ε-productions (expanding nullable occurrences).
  *      Per the paper, ε itself is dropped from the language: only empty
  *      paths could match it and that check is trivial.
  *   2. UNIT — eliminate unit productions `A → B` via unit closure.
  *   3. TERM — replace terminals inside bodies of length ≥ 2 with fresh
  *      nonterminals `Tx_i → x`.
  *   4. BIN  — binarize bodies of length ≥ 3 with fresh nonterminals.
  *
  * Original nonterminal names are preserved, so `R_A` computed on the CNF
  * grammar is directly the paper's `R_A` for every original `A`.
  */
object CNF {

  /** Transform `g` into an equivalent (modulo ε) CNF grammar. */
  def transform(g: Grammar): CnfGrammar = {
    val fresh = new FreshNames(g.nonterminals)
    val noEps  = eliminateEpsilon(g.productions)
    val noUnit = eliminateUnit(noEps)
    val termed = liftTerminals(noUnit, fresh)
    val binned = binarize(termed, fresh)

    val binary = mutable.ListBuffer.empty[(String, String, String)]
    val term   = mutable.ListBuffer.empty[(String, String)]
    binned.foreach {
      case Production(a, Seq(T(x)))       => term += ((a, x))
      case Production(a, Seq(N(b), N(c))) => binary += ((a, b, c))
      case p => sys.error(s"internal error: non-CNF production survived: $p")
    }
    CnfGrammar(binary.toList.distinct, term.toList.distinct)
  }

  /** Nonterminals that derive ε. */
  def nullable(productions: Seq[Production]): Set[String] = {
    var nul = productions.filter(_.rhs.isEmpty).map(_.lhs).toSet
    var changed = true
    while (changed) {
      changed = false
      productions.foreach { p =>
        if (!nul(p.lhs) && p.rhs.nonEmpty &&
            p.rhs.forall { case N(n) => nul(n); case _ => false }) {
          nul += p.lhs; changed = true
        }
      }
    }
    nul
  }

  /** DEL: expand every rule over all ways of dropping nullable symbols,
    * then remove all ε-rules.
    */
  private def eliminateEpsilon(productions: Seq[Production]): Seq[Production] = {
    val nul = nullable(productions)
    def expansions(rhs: Seq[Sym]): Seq[Seq[Sym]] = rhs match {
      case Seq() => Seq(Seq())
      case head +: tail =>
        val rest = expansions(tail)
        val keep = rest.map(head +: _)
        head match {
          case N(n) if nul(n) => keep ++ rest // drop the nullable occurrence
          case _              => keep
        }
    }
    productions
      .flatMap(p => expansions(p.rhs).map(r => Production(p.lhs, r)))
      .filter(_.rhs.nonEmpty)
      .distinct
  }

  /** UNIT: for every `A ⇒* B` via unit rules and non-unit `B → γ`, add
    * `A → γ`; then drop all unit rules. Rules `A → x` (single terminal)
    * are not unit rules and are kept.
    */
  private def eliminateUnit(productions: Seq[Production]): Seq[Production] = {
    val nts = productions.map(_.lhs).toSet
    val unitNext: Map[String, Set[String]] = productions.collect {
      case Production(a, Seq(N(b))) => a -> b
    }.groupBy(_._1).map { case (a, es) => a -> es.map(_._2).toSet }

    def closure(a: String): Set[String] = {
      var seen = Set(a)
      var frontier = Set(a)
      while (frontier.nonEmpty) {
        val next = frontier.flatMap(x => unitNext.getOrElse(x, Set.empty)) -- seen
        seen ++= next; frontier = next
      }
      seen
    }

    val nonUnit = productions.filterNot {
      case Production(_, Seq(N(_))) => true
      case _                        => false
    }
    val byLhs = nonUnit.groupBy(_.lhs)
    nts.toSeq.flatMap { a =>
      closure(a).toSeq.flatMap(b => byLhs.getOrElse(b, Seq.empty))
        .map(p => Production(a, p.rhs))
    }.distinct
  }

  /** TERM: in bodies of length ≥ 2, replace each terminal `x` with a fresh
    * nonterminal deriving it. One fresh nonterminal per distinct label.
    */
  private def liftTerminals(productions: Seq[Production], fresh: FreshNames): Seq[Production] = {
    val lifted = mutable.LinkedHashMap.empty[String, String] // label -> nt
    val out = productions.map {
      case p @ Production(_, rhs) if rhs.lengthCompare(2) >= 0 =>
        val newRhs = rhs.map {
          case T(x) => N(lifted.getOrElseUpdate(x, fresh.next(s"T_$x")))
          case s    => s
        }
        p.copy(rhs = newRhs)
      case p => p
    }
    out ++ lifted.map { case (x, nt) => Production(nt, Seq(T(x))) }
  }

  /** BIN: `A → X1 X2 … Xk` (k ≥ 3) becomes a right-nested chain of
    * binary rules through fresh nonterminals.
    */
  private def binarize(productions: Seq[Production], fresh: FreshNames): Seq[Production] =
    productions.flatMap {
      case p @ Production(_, rhs) if rhs.lengthCompare(3) < 0 => Seq(p)
      case Production(a, rhs) =>
        val links = rhs.dropRight(2).indices.map(_ => fresh.next(s"B_$a"))
        val heads = a +: links
        val tails = links :+ ""
        heads.zip(tails).zipWithIndex.map { case ((h, t), i) =>
          if (i < links.length) Production(h, Seq(rhs(i), N(t)))
          else Production(h, Seq(rhs(rhs.length - 2), rhs(rhs.length - 1)))
        }
    }

  /** Generates nonterminal names that do not collide with existing ones. */
  private final class FreshNames(taken: Set[String]) {
    private val used = mutable.Set.empty[String] ++= taken
    def next(base: String): String = {
      val clean = base.replaceAll("[^A-Za-z0-9_]", "_")
      var i = 0
      var cand = clean
      while (used.contains(cand)) { i += 1; cand = s"${clean}_$i" }
      used += cand
      cand
    }
  }
}
