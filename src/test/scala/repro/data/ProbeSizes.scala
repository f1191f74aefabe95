package repro.data

import repro.cfg.Queries
import repro.core.SparseCFPQ

/** Scratch probe (not a test): prints #results per dataset for tuning the
  * generator knobs against the paper's magnitudes. Run via Test/runMain.
  */
object ProbeSizes {
  def main(args: Array[String]): Unit = {
    for (d <- Datasets.all if d.repeatK == 1) {
      val g = d.graph
      val t0 = System.nanoTime()
      val q1 = SparseCFPQ.solve(g, Queries.q1Cnf)
      val q2 = SparseCFPQ.solve(g, Queries.q2Cnf)
      val ms = (System.nanoTime() - t0) / 1e6
      println(f"${d.name}%-30s triples=${d.triples}%6d nodes=${g.numNodes}%6d " +
        f"q1=${q1.count("S")}%8d (paper ${d.paperQ1.results}%8d)  " +
        f"q2=${q2.count("S")}%8d (paper ${d.paperQ2.results}%8d)  ${ms}%8.1f ms")
    }
  }
}
