package repro.core

import repro.cfg.CnfGrammar
import repro.graph.LabeledGraph

/** The most literal transcription of the paper's Algorithm 1: the matrix
  * `T` is kept as an actual `|V|×|V|` matrix of *sets of nonterminals*,
  * and one step computes `T ← T ∪ (T · T)` with the paper's set-product
  * `N₁·N₂ = {A | A→BC ∈ P, B ∈ N₁, C ∈ N₂}`.
  *
  * Quadratic-dense and slow — it exists as the executable ground truth:
  * every optimized engine is tested cell-for-cell against it, and
  * [[steps]] exposes the intermediate matrices T₀, T₁, … of §4.3.
  */
object NaiveSetMatrixCFPQ extends CFPQEngine {
  override val name = "NaiveSetMatrix"

  type SetMatrix = Vector[Vector[Set[String]]]

  /** Matrix initialization (Algorithm 1, lines 6–7). */
  def initial(graph: LabeledGraph, grammar: CnfGrammar): SetMatrix = {
    val n = graph.numNodes
    val t = Array.fill(n, n)(Set.empty[String])
    graph.edges.foreach { case (i, x, j) =>
      t(i)(j) ++= grammar.byTerminal.getOrElse(x, Set.empty)
    }
    t.map(_.toVector).toVector
  }

  /** One closure step: `T ∪ (T · T)` (Algorithm 1, line 9). */
  def step(t: SetMatrix, grammar: CnfGrammar): SetMatrix = {
    val n = t.length
    Vector.tabulate(n, n) { (i, k) =>
      val product = (0 until n).foldLeft(Set.empty[String]) { (acc, j) =>
        acc ++ (for {
          b <- t(i)(j); c <- t(j)(k)
          a <- grammar.byPair.getOrElse((b, c), Set.empty)
        } yield a)
      }
      t(i)(k) ++ product
    }
  }

  /** T₀, T₁, T₂, … — the sequence stabilizes; callers take while changing. */
  def steps(graph: LabeledGraph, grammar: CnfGrammar): LazyList[SetMatrix] =
    LazyList.iterate(initial(graph, grammar))(step(_, grammar))

  override def solve(graph: LabeledGraph, grammar: CnfGrammar): CFPQResult = {
    var t = initial(graph, grammar)
    var iterations = 0
    var changed = true
    while (changed) {
      iterations += 1
      val t2 = step(t, grammar)
      if (t2 == t) changed = false else t = t2
    }
    val rels = (for {
      i <- t.indices; j <- t.indices; a <- t(i)(j)
    } yield (a, (i, j))).groupBy(_._1).map { case (a, xs) => a -> xs.map(_._2).toSet }
    CFPQResult(rels, iterations)
  }
}
