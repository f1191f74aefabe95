package repro.core

import org.apache.spark.rdd.RDD
import org.apache.spark.sql.{DataFrame, Dataset, Encoder}
import org.apache.spark.storage.StorageLevel

/** Iteration-safe materialization for fixpoint loops.
  *
  * `Dataset.localCheckpoint()` truncates lineage but *carries over* the
  * optimized plan's statistics into the resulting `LogicalRDD`. In an
  * iterated self-join (the transitive-closure loop, Algorithm 1 line 9)
  * those `sizeInBytes` estimates compound multiplicatively: iteration k's
  * plan multiplies iteration k−1's checkpointed stats several times, so
  * the BigInt estimate grows with ~3^k digits and Catalyst ends up
  * spending minutes multiplying million-digit integers (observed on the
  * wine graph at ~12 iterations).
  *
  * [[Materialize.frame]] instead persists the underlying RDD, forces it,
  * and rebuilds a fresh DataFrame — lineage truncated *and* statistics
  * reset to defaults. The previous iteration's handle is unpersisted by
  * the caller once the new one is live.
  */
object Materialize {

  /** A materialized dataset: the rebuilt frame, its row count, and the
    * persisted RDD backing it (kept so the caller can unpersist it when
    * the next iteration has been materialized).
    */
  final case class Pinned[T](data: T, count: Long, handle: RDD[_]) {
    def release(): Unit = handle.unpersist(blocking = false)
  }

  /** Materialize a DataFrame; returns the frame, its count, and the handle. */
  def frame(df: DataFrame): Pinned[DataFrame] = {
    val rdd = df.rdd
    rdd.persist(StorageLevel.MEMORY_AND_DISK)
    val n = rdd.count()
    Pinned(df.sparkSession.createDataFrame(rdd, df.schema), n, rdd)
  }

  /** Materialize a typed Dataset; returns dataset, count, handle. */
  def dataset[T: Encoder](ds: Dataset[T]): Pinned[Dataset[T]] = {
    val rdd = ds.rdd
    rdd.persist(StorageLevel.MEMORY_AND_DISK)
    val n = rdd.count()
    Pinned(ds.sparkSession.createDataset(rdd), n, rdd)
  }
}
