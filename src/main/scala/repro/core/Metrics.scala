package repro.core

import java.util.concurrent.ConcurrentLinkedQueue
import java.util.concurrent.atomic.AtomicLong
import scala.jdk.CollectionConverters._

/** Thread-safe instrumentation of the query workload (paper Fig 9): how many
  * message-passing queries vs split-finding queries ran, with latencies, plus
  * message-cache hit counters.
  */
final class Metrics extends Serializable {
  private val messageCount = new AtomicLong
  private val splitCount   = new AtomicLong
  private val hitCount     = new AtomicLong
  private val missCount    = new AtomicLong
  private val messageMs    = new ConcurrentLinkedQueue[Long]
  private val splitMs      = new ConcurrentLinkedQueue[Long]

  def timeMessage[T](f: => T): T = {
    val t0 = System.nanoTime
    val r  = f
    messageCount.incrementAndGet()
    messageMs.add((System.nanoTime - t0) / 1000000)
    r
  }

  def timeSplit[T](f: => T): T = {
    val t0 = System.nanoTime
    val r  = f
    splitCount.incrementAndGet()
    splitMs.add((System.nanoTime - t0) / 1000000)
    r
  }

  def cacheHit(): Unit  = hitCount.incrementAndGet()
  def cacheMiss(): Unit = missCount.incrementAndGet()

  def snapshot: MetricsSnapshot = MetricsSnapshot(
    messageQueries = messageCount.get,
    splitQueries   = splitCount.get,
    cacheHits      = hitCount.get,
    cacheMisses    = missCount.get,
    messageMs      = messageMs.asScala.toVector,
    splitMs        = splitMs.asScala.toVector,
  )

  def reset(): Unit = {
    messageCount.set(0); splitCount.set(0); hitCount.set(0); missCount.set(0)
    messageMs.clear(); splitMs.clear()
  }
}

final case class MetricsSnapshot(
    messageQueries: Long,
    splitQueries: Long,
    cacheHits: Long,
    cacheMisses: Long,
    messageMs: Vector[Long],
    splitMs: Vector[Long],
) {
  /** Latency histogram with the given bucket upper bounds (ms). */
  def histogram(times: Vector[Long], bounds: Vector[Long] = Vector(10, 50, 100, 200, 500, 1000, 5000)): Seq[(String, Int)] = {
    val buckets = bounds.map(b => s"<=${b}ms" -> times.count(_ <= b))
    val diffed = buckets.zip(0 +: buckets.map(_._2).dropRight(1)).map { case ((l, c), prev) => l -> (c - prev) }
    diffed :+ (s">${bounds.last}ms" -> times.count(_ > bounds.last))
  }
}
