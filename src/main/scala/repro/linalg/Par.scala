package repro.linalg

import java.util.concurrent.{Callable, Executors, TimeUnit}

/** Minimal data-parallel range helper (no external deps).
  *
  * Used for driver-side hot loops (k-means training, brute-force ground
  * truth) where Spark job overhead would dominate. Deterministic: work is
  * split into contiguous chunks, results combined in chunk order.
  */
object Par {
  private val nThreads = math.max(1, Runtime.getRuntime.availableProcessors())

  /** Run `body(lo, hi)` over disjoint chunks of `[0, n)` in parallel;
    * returns per-chunk results in chunk order.
    */
  def mapChunks[T](n: Int, body: (Int, Int) => T): IndexedSeq[T] = {
    if (n <= 0) return IndexedSeq.empty
    val chunks = math.min(nThreads * 2, n)
    val step = (n + chunks - 1) / chunks
    val bounds = (0 until n by step).map(lo => (lo, math.min(n, lo + step)))
    if (bounds.size == 1) return bounds.map { case (lo, hi) => body(lo, hi) }
    val pool = Executors.newFixedThreadPool(math.min(nThreads, bounds.size))
    try {
      val futures = bounds.map { case (lo, hi) =>
        pool.submit(new Callable[T] { def call(): T = body(lo, hi) })
      }
      futures.map(_.get())
    } finally {
      pool.shutdown()
      pool.awaitTermination(1, TimeUnit.MINUTES)
    }
  }

  /** Parallel foreach over `[0, n)` in contiguous chunks. */
  def foreachChunk(n: Int, body: (Int, Int) => Unit): Unit = {
    mapChunks[Unit](n, body); ()
  }
}
