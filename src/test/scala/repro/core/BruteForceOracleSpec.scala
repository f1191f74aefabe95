package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import repro.cfg.{CnfGrammar, CYK}
import repro.graph.LabeledGraph

/** Ground truth from first principles: enumerate every labeled path up to a
  * length bound, accept its word with CYK, and compare with the engines.
  *
  * On *acyclic* graphs with n nodes every simple path has < n edges, so a
  * bound of n − 1 makes the oracle exact. On cyclic graphs the oracle is a
  * lower bound (⊆) of the true relation.
  */
class BruteForceOracleSpec extends AnyFunSuite {
  import EngineFixtures._

  /** All (src, dst, word) with path length in [1, maxLen], deduplicated. */
  private def pathWords(g: LabeledGraph, maxLen: Int): Set[(Int, Int, List[String])] = {
    var frontier: Set[(Int, Int, List[String])] =
      g.edges.map { case (s, l, d) => (s, d, List(l)) }.toSet
    var all = frontier
    for (_ <- 2 to maxLen) {
      frontier = for {
        (s, mid, w) <- frontier
        (m2, l, d) <- g.edges.toSet[(Int, String, Int)]
        if m2 == mid
      } yield (s, d, w :+ l)
      all ++= frontier
    }
    all
  }

  private def oracle(g: LabeledGraph, cnf: CnfGrammar, nt: String, maxLen: Int): Set[(Int, Int)] =
    pathWords(g, maxLen).collect { case (s, d, w) if CYK.accepts(cnf, nt, w) => (s, d) }

  private def randomDag(rnd: Random, alphabet: Seq[String]): LabeledGraph = {
    val n = 2 + rnd.nextInt(5)
    val edges = for {
      i <- 0 until n; j <- (i + 1) until n
      if rnd.nextDouble() < 0.5
    } yield (i, alphabet(rnd.nextInt(alphabet.length)), j)
    LabeledGraph(n, edges.toVector)
  }

  for {
    (gname, _, cnf, start) <- grammars
    i <- 0 until 8
  } test(s"[$gname #$i] acyclic graph: engines equal the brute-force oracle exactly") {
    val rnd = new Random(31 * gname.hashCode + i)
    val g = randomDag(rnd, cnf.terminals.toSeq.sorted)
    val exact = oracle(g, cnf, start, maxLen = math.max(1, g.numNodes - 1))
    assert(SparseCFPQ.solve(g, cnf)(start) == exact, "Sparse vs oracle")
    assert(DenseCFPQ.solve(g, cnf)(start) == exact, "Dense vs oracle")
  }

  for {
    (gname, _, cnf, start) <- grammars
    i <- 0 until 6
  } test(s"[$gname #$i] cyclic graph: oracle paths up to length 7 are all found") {
    val rnd = new Random(67 * gname.hashCode + i)
    val g = randomGraph(rnd, cnf.terminals.toSeq.sorted, maxNodes = 5)
    val lower = oracle(g, cnf, start, maxLen = 7)
    val got = SparseCFPQ.solve(g, cnf)(start)
    assert(lower.subsetOf(got),
      s"missing pairs: ${lower.diff(got)}")
  }

  test("hand-built chain: subClassOf_r then subClassOf relates a parent to itself") {
    // Triples 1 sco 0 and 2 sco 0 yield edges (1,sco,0),(2,sco,0) and the
    // inverses (0,sco_r,1),(0,sco_r,2). The word sco_r·sco walks DOWN to a
    // child and back UP, so R_S relates the common parent to itself only.
    val g = LabeledGraph(Seq((1, "subClassOf", 0), (2, "subClassOf", 0))).withInverses()
    val rs = SparseCFPQ.solve(g, repro.cfg.Queries.q1CnfPaper)("S")
    assert(rs == Set((0, 0)))
    // ... which the brute-force oracle confirms:
    assert(rs == oracle(g, repro.cfg.Queries.q1CnfPaper, "S", maxLen = 4))
  }

  test("hand-built two-layer tree: q2 relates child layer to parent layer") {
    // Triples: 1 sco 0, 2 sco 0, 3 sco 1.  Q2: S -> B sco | sco, B -> sco_r B sco | sco_r sco.
    val g = LabeledGraph(Seq((1, "subClassOf", 0), (2, "subClassOf", 0), (3, "subClassOf", 1)))
      .withInverses()
    val rs = SparseCFPQ.solve(g, repro.cfg.Queries.q2Cnf)("S")
    // S -> sco: (1,0),(2,0),(3,1).  S -> B sco where B = same layer: e.g. 3 ~B~ 3 then sco: (3,1);
    // B(1,2) via sco_r sco then sco: (1,0) etc. — all pairs child→itsLayerParent.
    assert(rs.contains((1, 0)) && rs.contains((2, 0)) && rs.contains((3, 1)))
    // and q2 never relates a node to itself here (acyclic hierarchy)
    assert(rs.forall { case (a, b) => a != b })
  }
}
