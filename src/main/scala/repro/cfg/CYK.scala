package repro.cfg

/** Cocke–Younger–Kasami recognizer for CNF grammars.
  *
  * Two roles in this reproduction:
  *   - membership oracle for CNF grammars (paired with [[Earley]] on the
  *     original grammar to validate [[CNF.transform]]);
  *   - word-level ground truth for the brute-force path oracle used to
  *     test the CFPQ engines on tiny graphs.
  */
object CYK {

  /** Is `word` (nonempty sequence of terminal labels) derivable from `start`? */
  def accepts(g: CnfGrammar, start: String, word: Seq[String]): Boolean =
    if (word.isEmpty) false // CNF here is ε-free, per the paper
    else parseTable(g, word)(0)(word.length).contains(start)

  /** The CYK table: `table(i)(j)` = nonterminals deriving `word[i, j)`.
    * Indexed by start position and *end* position (exclusive).
    */
  def parseTable(g: CnfGrammar, word: Seq[String]): Array[Array[Set[String]]] = {
    val n = word.length
    val table = Array.fill(n + 1, n + 1)(Set.empty[String])
    for (i <- 0 until n)
      table(i)(i + 1) = g.byTerminal.getOrElse(word(i), Set.empty)
    for {
      len  <- 2 to n
      i    <- 0 to n - len
      j     = i + len
      mid  <- (i + 1) until j
      b    <- table(i)(mid)
      c    <- table(mid)(j)
      a    <- g.byPair.getOrElse((b, c), Set.empty)
    } table(i)(j) += a
    table
  }
}
