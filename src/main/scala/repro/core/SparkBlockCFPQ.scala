package repro.core

import org.apache.spark.sql.SparkSession
import repro.cfg.CnfGrammar
import repro.graph.LabeledGraph
import repro.linalg.BlockBoolMatrix

/** Algorithm 1 over a *distributed block-sparse* Boolean matrix — the
  * paper's **sGPU** analog.
  *
  * The paper offloads CSR Boolean multiplications to CUSPARSE on a GPU;
  * here the per-nonterminal matrices are tiled into sparse blocks spread
  * over Spark partitions, and every block-pair product of the closure step
  * runs as a local Boolean kernel inside a Spark task
  * ([[repro.linalg.BlockBoolMatrix.multiply]]). Spark tasks over blocks
  * stand in for CUDA thread blocks: the speedup mechanism (parallel sparse
  * kernels on independent sub-matrices) is the same.
  *
  * @param spark     session to run on
  * @param blockSize side of square tiles; small graphs collapse to one
  *                  block, large ones fan out across the cluster
  */
final class SparkBlockCFPQ(spark: SparkSession, blockSize: Int = 512) extends CFPQEngine {
  override val name = "SparkBlock"

  override def solve(graph: LabeledGraph, grammar: CnfGrammar): CFPQResult = {
    import spark.implicits._
    val init = MatrixInit.cells(graph, grammar)
    // Materialize.dataset (not localCheckpoint) — see Materialize for why
    // iterated self-joins must also reset plan statistics each round.
    var cur = Materialize.dataset(
      BlockBoolMatrix.fromPairs(spark, math.max(graph.numNodes, 1), blockSize, init))
    var size = BlockBoolMatrix.nnz(cur.data)
    var iterations = 0
    if (grammar.binary.isEmpty) {
      return CFPQResult(BlockBoolMatrix.collectPairs(cur.data, blockSize), 1)
    }
    var changed = true
    while (changed) {
      iterations += 1
      // One fused shuffle per iteration: partial products + previous T
      // coalesced together (T ∪ T·T in a single reduce stage).
      val prod = BlockBoolMatrix.multiplyPartials(spark, cur.data, grammar.binary, blockSize)
      val next = Materialize.dataset(
        BlockBoolMatrix.coalesceBlocks(cur.data.union(prod)))
      val size2 = BlockBoolMatrix.nnz(next.data)
      if (size2 == size) { next.release(); changed = false }
      else { cur.release(); cur = next; size = size2 }
    }
    val result = CFPQResult(BlockBoolMatrix.collectPairs(cur.data, blockSize), iterations)
    cur.release()
    result
  }
}
