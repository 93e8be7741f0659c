package repro.engine

import org.apache.spark.rdd.RDD
import scala.reflect.ClassTag
import repro.core.{LeafCtx, Serde, Sketch}
import repro.storage.CachedTable

/** One partial update delivered to the root (§5.3): the merged summary so
  * far, progress (leaves completed), elapsed time, and the serialized size
  * of the update this wave sent up the tree — the root-received bytes the
  * paper plots in Fig. 5 (bottom).
  */
final case class Partial[S](
    value: S,
    leavesDone: Int,
    leavesTotal: Int,
    elapsedMs: Double,
    bytesThisUpdate: Long
)

/** Outcome of a progressive run: all partials in arrival order. */
final case class ProgressiveResult[S](partials: Vector[Partial[S]], cancelled: Boolean) {
  def finalValue: S          = partials.last.value
  def firstPartialMs: Double = partials.head.elapsedMs
  def totalMs: Double        = partials.last.elapsedMs
  def totalBytes: Long       = partials.map(_.bytesThisUpdate).sum
  def updates: Int           = partials.length
}

/** The distributed execution tree (§5.3): leaves run `summarize` over
  * micropartitions in parallel; aggregation nodes `merge`; the root
  * receives either the final summary (`run`) or a stream of partial
  * results (`runProgressive`), without waiting for stragglers.
  *
  * On Spark, leaves are partitions of the cached block RDD; the
  * aggregation layer is `treeAggregate` (for `run`) or per-wave jobs whose
  * in-wave merge models an aggregation node (for `runProgressive`).
  */
object ExecutionTree {

  /** Per-leaf summaries; blocks within a partition merge locally first
    * (a worker-level aggregation node).
    */
  private def leafSummaries[S: ClassTag](t: CachedTable, sk: Sketch[S], seed: Long): RDD[S] =
    t.blocks.mapPartitionsWithIndex { (pid, it) =>
      var acc     = sk.zero
      var blockNo = 0
      while (it.hasNext) {
        val b = it.next()
        acc = sk.merge(acc, sk.summarize(b, LeafCtx(pid * 100000 + blockNo, seed)))
        blockNo += 1
      }
      Iterator.single(acc)
    }

  /** Blocking execution: full tree, final summary only. */
  def run[S: ClassTag](t: CachedTable, sk: Sketch[S], seed: Long = 0L, depth: Int = 2): S =
    leafSummaries(t, sk, seed).treeAggregate(sk.zero)(sk.merge, sk.merge, depth)

  /** Progressive execution: ALL leaves run in parallel (one Spark job);
    * as each leaf's summary arrives at the root it is queued, and the
    * root batches arrivals on a 0.1-second aggregation interval before
    * emitting a partial — the paper's straggler-tolerant design (§5.3:
    * "nodes periodically propagate partially merged results … aggregation
    * nodes wait for 0.1 seconds and aggregate all results that arrive
    * within this interval").
    *
    * Cancellation cancels the job, which drops not-yet-started
    * micropartitions; running ones are not interrupted, exactly as in the
    * paper ("we currently do not stop ongoing computations").
    */
  def runProgressive[S: ClassTag](
      t: CachedTable,
      sk: Sketch[S],
      seed: Long = 0L,
      aggregationIntervalMs: Long = 100L,
      cancel: Partial[S] => Boolean = (_: Partial[S]) => false
  ): ProgressiveResult[S] = {
    val summ  = leafSummaries(t, sk, seed)
    val sc    = summ.sparkContext
    val parts = summ.getNumPartitions
    if (parts == 0) return ProgressiveResult(Vector(Partial(sk.zero, 0, 0, 0.0, 0L)), cancelled = false)

    val queue = new java.util.concurrent.ConcurrentLinkedQueue[S]()
    val start = System.nanoTime()
    val action = sc.submitJob[S, S, Unit](
      summ,
      (it: Iterator[S]) => it.foldLeft(sk.zero)(sk.merge),
      0 until parts,
      (_: Int, s: S) => { queue.add(s); () },
      ())

    var acc       = sk.zero
    var done      = 0
    var cancelled = false
    var lastEmit  = start
    var pending   = sk.zero
    var pendingN  = 0
    val partials  = Vector.newBuilder[Partial[S]]

    def elapsedMs = (System.nanoTime() - start) / 1e6

    while (done < parts && !cancelled) {
      Thread.sleep(2)
      var s = queue.poll()
      while (s != null) { pending = sk.merge(pending, s); pendingN += 1; s = queue.poll() }
      val complete = done + pendingN == parts
      val interval = (System.nanoTime() - lastEmit) / 1e6 >= aggregationIntervalMs
      if (pendingN > 0 && (complete || interval)) {
        // The aggregation layer ships one merged update; the root merges
        // it into the running result and forwards a partial to the UI.
        acc = sk.merge(acc, pending)
        done += pendingN
        val p = Partial(acc, done, parts, elapsedMs, Serde.sizeOf(pending))
        partials += p
        pending = sk.zero
        pendingN = 0
        lastEmit = System.nanoTime()
        if (!complete && cancel(p)) {
          cancelled = true
          action.cancel()
        }
      }
      if (!cancelled && action.isCompleted && queue.isEmpty && done + pendingN < parts)
        action.value.get.get // propagate the job failure
    }
    ProgressiveResult(partials.result(), cancelled)
  }
}
