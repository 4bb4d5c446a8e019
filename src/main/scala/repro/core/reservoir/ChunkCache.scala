package repro.core.reservoir

import java.util.concurrent.{ExecutorService, Executors, TimeUnit}
import scala.collection.mutable

/** LRU cache of decompressed chunks with eager (asynchronous) prefetch of
  * the next chunk in sequence (§4.1.1, Figure 5).
  *
  * Windows consume events strictly by timestamp order, so when an iterator
  * starts reading chunk N the cache schedules a load of N+1; by the time the
  * iterator crosses the boundary the chunk is normally already decompressed
  * in memory. A miss pays the load (I/O from the OS page cache in practice)
  * plus decompression/deserialization — the latency-spike source studied in
  * experiment 9(b).
  */
final class ChunkCache(val capacity: Int, loader: Long => Chunk) {

  private val map = new java.util.LinkedHashMap[Long, Chunk](capacity, 0.75f, true)
  private val inFlight = mutable.HashSet.empty[Long]
  private val lock = new Object

  @volatile private var prefetchPool: ExecutorService = Executors.newSingleThreadExecutor { r =>
    val t = new Thread(r, "chunk-prefetch"); t.setDaemon(true); t
  }

  var hits: Long = 0L
  var misses: Long = 0L
  var evictions: Long = 0L
  var prefetches: Long = 0L

  /** Fetches a chunk, loading (and charging a miss) if absent. */
  def get(chunkId: Long): Chunk = {
    lock.synchronized {
      val c = map.get(chunkId)
      if (c != null) { hits += 1; return c }
      misses += 1
    }
    val loaded = loader(chunkId)
    put(chunkId, loaded)
    loaded
  }

  def contains(chunkId: Long): Boolean = lock.synchronized(map.containsKey(chunkId))

  private def put(chunkId: Long, c: Chunk): Unit = lock.synchronized {
    if (!map.containsKey(chunkId)) {
      map.put(chunkId, c)
      while (map.size() > capacity) {
        val it = map.entrySet().iterator()
        it.next(); it.remove()
        evictions += 1
      }
    }
  }

  /** Schedules an eager background load of `chunkId` if absent. `available`
    * guards against prefetching a chunk that is not yet persisted.
    */
  def prefetch(chunkId: Long, available: Long => Boolean): Unit = {
    val should = lock.synchronized {
      if (map.containsKey(chunkId) || inFlight.contains(chunkId)) false
      else { inFlight += chunkId; true }
    }
    if (should) {
      prefetchPool.execute { () =>
        try {
          if (available(chunkId)) {
            val c = loader(chunkId)
            put(chunkId, c)
            lock.synchronized { prefetches += 1 }
          }
        } catch { case _: Throwable => () } // prefetch is best-effort
        finally lock.synchronized { inFlight -= chunkId }
      }
    }
  }

  /** Waits for outstanding prefetches (determinism in tests). */
  def quiesce(): Unit = {
    val old = prefetchPool
    old.shutdown()
    old.awaitTermination(30, TimeUnit.SECONDS)
    prefetchPool = Executors.newSingleThreadExecutor { r =>
      val t = new Thread(r, "chunk-prefetch"); t.setDaemon(true); t
    }
  }

  def size: Int = lock.synchronized(map.size())

  def stats: CacheStats = lock.synchronized(CacheStats(hits, misses, evictions, prefetches))
}

final case class CacheStats(hits: Long, misses: Long, evictions: Long, prefetches: Long) {
  def hitRate: Double = if (hits + misses == 0) 1.0 else hits.toDouble / (hits + misses)
}
