package repro.engine

import java.io._
import repro.core.{Op, PushJoin, SimpleExec}
import scala.collection.mutable.ArrayBuffer

/** Shared row-level helpers for the runtime engine. Rows are `Array[Int]`
  * in the producing operator's `matched` column order; 4 bytes per id.
  */
object Kernels {
  def rowBytes(row: Array[Int]): Long = 4L * row.length
  def batchBytes(batch: Array[Array[Int]]): Long =
    batch.iterator.map(rowBytes).sum

  def condsOk(op: Op, row: Array[Int]): Boolean = SimpleExec.condsOk(op, row)

  /** Precompute an operator's symmetry conditions as column-index pairs so
    * the hot loops never do Vector.indexOf per row.
    */
  def condCols(op: Op): Array[Array[Int]] =
    op.conds.map { case (a, b) => Array(op.col(a), op.col(b)) }.toArray

  def condsOkFast(cc: Array[Array[Int]], row: Array[Int]): Boolean = {
    var i = 0
    while (i < cc.length) {
      if (row(cc(i)(0)) >= row(cc(i)(1))) return false
      i += 1
    }
    true
  }

  /** Per-pair join kernel: merges one (left, right) row pair — cross-side
    * injectivity and the join's symmetry conditions enforced (same
    * semantics as SimpleExec's PushJoin). Returns null if the pair is
    * infeasible.
    */
  final class PairJoin(j: PushJoin) {
    private val rExtraCols: Array[Int] = j.right.matched.zipWithIndex
      .collect { case (v, i) if !j.left.matched.contains(v) => i }.toArray
    private val width = j.matched.length
    private val cc    = condCols(j)

    def tryJoin(l: Array[Int], r: Array[Int]): Array[Int] = {
      val row = java.util.Arrays.copyOf(l, width)
      var i   = 0
      while (i < rExtraCols.length) {
        val v = r(rExtraCols(i))
        var p = 0
        while (p < l.length) { if (l(p) == v) return null; p += 1 }
        row(l.length + i) = v
        i += 1
      }
      if (condsOkFast(cc, row)) row else null
    }
  }

  /** Join one key-group: every (left, right) pair through [[PairJoin]]. */
  def joinGroups(j: PushJoin, left: collection.Seq[Array[Int]],
                 right: collection.Seq[Array[Int]],
                 emit: Array[Int] => Unit): Unit = {
    val pj = new PairJoin(j)
    for (l <- left; r <- right) {
      val row = pj.tryJoin(l, r)
      if (row != null) emit(row)
    }
  }

  /** Open-addressing int hash set (no boxing) — the fetch stage dedups the
    * remote pivot vertices of every batch, so this path must be cheap for
    * the paper's "t_f is a small fraction of runtime" to hold.
    */
  final class IntSet(initialCapacity: Int = 1024) {
    private var mask  = Integer.highestOneBit(math.max(16, initialCapacity) * 2 - 1) * 2 - 1
    private var table = Array.fill(mask + 1)(-1)
    private var n     = 0

    def size: Int = n

    /** Returns true if v was newly added. */
    def add(v: Int): Boolean = {
      var i = (v * 0x9E3779B9 >>> 8) & mask
      while (true) {
        val cur = table(i)
        if (cur == v) return false
        if (cur == -1) {
          table(i) = v
          n += 1
          if (n * 4 > mask * 3) grow()
          return true
        }
        i = (i + 1) & mask
      }
      false
    }

    private def grow(): Unit = {
      val old = table
      mask = mask * 2 + 1
      table = Array.fill(mask + 1)(-1)
      n = 0
      old.foreach(v => if (v != -1) add(v))
    }

    def foreach(f: Int => Unit): Unit = table.foreach(v => if (v != -1) f(v))
  }

  /** Lexicographic comparison of two rows on the given key columns. */
  def compareKeys(a: Array[Int], aCols: Array[Int], b: Array[Int], bCols: Array[Int]): Int = {
    var i = 0
    while (i < aCols.length) {
      val c = Integer.compare(a(aCols(i)), b(bCols(i)))
      if (c != 0) return c
      i += 1
    }
    0
  }
}

/** One side of a buffered distributed hash join (§4.3) on one machine.
  *
  * Producers add shuffled rows; when the in-memory buffer exceeds the
  * threshold the rows are sorted by join key and spilled to disk as a run
  * ("external merge sort via the join keys"). `sortedIterator` merges the
  * in-memory rest with all on-disk runs into one key-ordered stream, so the
  * join reads each key group streaming — memory stays bounded by the buffer
  * size regardless of input size.
  */
final class JoinSideBuffer(rowWidth: Int, keyCols: Array[Int], spillThresholdRows: Int,
                           machine: Int, metrics: Metrics) {
  private val mem   = new ArrayBuffer[Array[Int]]()
  private val runs  = new ArrayBuffer[File]()
  private var total = 0L

  private def keyOrdering: Ordering[Array[Int]] =
    (a, b) => Kernels.compareKeys(a, keyCols, b, keyCols)

  def add(row: Array[Int]): Unit = this.synchronized {
    mem += row
    total += 1
    metrics.memAdd(machine, Kernels.rowBytes(row))
    if (mem.length >= spillThresholdRows) spill()
  }

  def rows: Long = this.synchronized(total)

  private def spill(): Unit = {
    val sorted = mem.sorted(keyOrdering)
    val f      = File.createTempFile(s"huge-join-m$machine", ".run")
    f.deleteOnExit()
    val out = new DataOutputStream(new BufferedOutputStream(new FileOutputStream(f), 1 << 16))
    try sorted.foreach { r => var i = 0; while (i < rowWidth) { out.writeInt(r(i)); i += 1 } }
    finally out.close()
    runs += f
    metrics.spilledBytes.addAndGet(4L * rowWidth * sorted.length)
    metrics.memAdd(machine, -mem.iterator.map(Kernels.rowBytes).sum)
    mem.clear()
  }

  /** Key-ordered iterator over all buffered rows (memory + spilled runs).
    * Call once, after all producers are done.
    */
  def sortedIterator(): Iterator[Array[Int]] = this.synchronized {
    val memSorted = mem.sorted(keyOrdering).iterator
    val runIts: Seq[Iterator[Array[Int]]] = runs.toSeq.map(readRun)
    val its = (memSorted +: runIts).map(_.buffered).filter(_.hasNext)
    if (its.isEmpty) return Iterator.empty
    if (its.size == 1) return its.head // common case: nothing spilled
    new Iterator[Array[Int]] {
      private val heap = new java.util.PriorityQueue[scala.collection.BufferedIterator[Array[Int]]](
        math.max(1, its.size),
        (x, y) => Kernels.compareKeys(x.head, keyCols, y.head, keyCols))
      its.foreach(heap.add)
      def hasNext: Boolean = !heap.isEmpty
      def next(): Array[Int] = {
        val it = heap.poll()
        val r  = it.next()
        if (it.hasNext) heap.add(it)
        r
      }
    }
  }

  private def readRun(f: File): Iterator[Array[Int]] = {
    val in = new DataInputStream(new BufferedInputStream(new FileInputStream(f), 1 << 16))
    new Iterator[Array[Int]] {
      private var nextRow: Array[Int] = advance()
      private def advance(): Array[Int] =
        try {
          val r = new Array[Int](rowWidth)
          var i = 0
          while (i < rowWidth) { r(i) = in.readInt(); i += 1 }
          r
        } catch { case _: EOFException => in.close(); null }
      def hasNext: Boolean = nextRow != null
      def next(): Array[Int] = { val r = nextRow; nextRow = advance(); r }
    }
  }

  /** Release in-memory rows (after the join consumed the iterator). */
  def clear(): Unit = this.synchronized {
    metrics.memAdd(machine, -mem.iterator.map(Kernels.rowBytes).sum)
    mem.clear()
    runs.foreach(_.delete())
    runs.clear()
  }
}
