package repro.engine

import java.util.concurrent.{CountDownLatch, Executors, ThreadFactory}
import scala.collection.mutable.ArrayBuffer

/** Per-machine worker pool implementing intra-machine work stealing (§5.3).
  *
  * The intersect stage of a batch is split into row chunks distributed
  * round-robin to per-worker deques. A worker pops from the *back* of its
  * own deque; when empty it picks a random victim and steals half of the
  * victim's chunks from the *front* (Chase–Lev style discipline over a
  * simple synchronized deque — the contention object is the shared cache,
  * not the deque, at this worker count).
  */
final class WorkerPool(val machine: Int, nWorkers: Int, metrics: Metrics) {
  require(nWorkers >= 1)

  private val exec = Executors.newFixedThreadPool(nWorkers, new ThreadFactory {
    private val n = new java.util.concurrent.atomic.AtomicInteger
    def newThread(r: Runnable): Thread = {
      val t = new Thread(r, s"m$machine-worker-${n.getAndIncrement()}")
      t.setDaemon(true); t
    }
  })

  /** Process `rows` in parallel: `process(row, out)` appends result rows to
    * the worker-local buffer `out`. Returns all output rows. The caller
    * thread blocks until every chunk is done (the stage barrier of §4.2).
    */
  def run(rows: IndexedSeq[Array[Int]], chunkSize: Int,
          cancelled: () => Boolean = () => false)
         (process: (Array[Int], ArrayBuffer[Array[Int]]) => Unit): ArrayBuffer[Array[Int]] = {
    if (rows.isEmpty) return ArrayBuffer.empty
    if (nWorkers == 1 || rows.length <= chunkSize) {
      val out = new ArrayBuffer[Array[Int]]()
      var i = 0
      while (i < rows.length && !cancelled()) { process(rows(i), out); i += 1 }
      return out
    }
    val deques = Array.fill(nWorkers)(new java.util.ArrayDeque[Seq[Int]]())
    val chunks = rows.indices.grouped(chunkSize).toVector
    for ((c, i) <- chunks.zipWithIndex)
      deques(i % nWorkers).addLast(c)
    val outs  = Array.fill(nWorkers)(new ArrayBuffer[Array[Int]]())
    val latch = new CountDownLatch(nWorkers)
    for (w <- 0 until nWorkers) exec.execute { () =>
      val rng = java.util.concurrent.ThreadLocalRandom.current()
      try {
        var chunk: Seq[Int] = null
        var done = false
        while (!done) {
          chunk = deques(w).synchronized(deques(w).pollLast())
          if (chunk == null) {
            // Steal half of a random victim's remaining chunks from the front.
            val victim = rng.nextInt(nWorkers)
            if (victim != w) {
              val stolen = deques(victim).synchronized {
                val half = (deques(victim).size + 1) / 2
                (0 until half).flatMap(_ => Option(deques(victim).pollFirst()))
              }
              if (stolen.nonEmpty) {
                metrics.stealsIntra.incrementAndGet()
                deques(w).synchronized(stolen.foreach(deques(w).addLast))
              } else if (deques.forall(d => d.synchronized(d.isEmpty))) done = true
            } else if (deques.forall(d => d.synchronized(d.isEmpty))) done = true
          } else if (!cancelled()) {
            val out = outs(w)
            val it  = chunk.iterator
            while (it.hasNext && !cancelled()) process(rows(it.next()), out)
          } else done = true
        }
      } finally latch.countDown()
    }
    latch.await()
    val total = new ArrayBuffer[Array[Int]](outs.iterator.map(_.length).sum)
    outs.foreach(total ++= _)
    total
  }

  def shutdown(): Unit = exec.shutdownNow()
}

/** A bounded FIFO of row batches — the fixed-capacity output queue Q_O that
  * drives the DFS/BFS-adaptive scheduler (§5.2). Thread-safe because
  * inter-machine thieves dequeue from remote machines' queues.
  */
final class BatchQueue(capacityRows0: Long, machine: Int, metrics: Metrics) {
  /** Capacity 1 row = DFS-style scheduling (one batch in flight); the
    * queue still accepts the overflow of the producing batch (§5.2).
    */
  val capacityRows: Long = math.max(1L, capacityRows0)
  private val q = new java.util.ArrayDeque[Array[Array[Int]]]()
  private var rowCount: Long = 0L

  def enqueue(batch: Array[Array[Int]]): Unit = if (batch.nonEmpty) this.synchronized {
    q.addLast(batch)
    rowCount += batch.length
    metrics.memAdd(machine, Kernels.batchBytes(batch))
  }

  def tryDequeue(): Array[Array[Int]] = this.synchronized {
    val b = q.pollFirst()
    if (b != null) { rowCount -= b.length; metrics.memAdd(machine, -Kernels.batchBytes(b)) }
    b
  }

  def isFull: Boolean  = this.synchronized(rowCount >= capacityRows)
  def isEmpty: Boolean = this.synchronized(q.isEmpty)
  def rows: Long       = this.synchronized(rowCount)
}
