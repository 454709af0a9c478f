package repro.core

import java.util.concurrent.atomic.AtomicInteger
import repro.SparkSpec

class SchedulerMetricsSpec extends SparkSpec {

  test("parMap preserves input order") {
    val out = Scheduler.parMap(1 to 20, 8)(i => i * 2)
    assert(out == (1 to 20).map(_ * 2))
  }

  test("parMap with parallelism 1 is plain sequential map") {
    val order = scala.collection.mutable.ArrayBuffer.empty[Int]
    Scheduler.parMap(1 to 5, 1) { i => order.synchronized(order += i); i }
    assert(order.toSeq == (1 to 5))
  }

  test("parMap actually runs concurrently") {
    val inFlight = new AtomicInteger(0)
    val maxSeen  = new AtomicInteger(0)
    Scheduler.parMap(1 to 8, 4) { _ =>
      val cur = inFlight.incrementAndGet()
      maxSeen.getAndUpdate(m => math.max(m, cur))
      Thread.sleep(50)
      inFlight.decrementAndGet()
    }
    assert(maxSeen.get() >= 2, s"no concurrency observed (max in flight ${maxSeen.get()})")
  }

  test("parMap propagates exceptions") {
    assertThrows[RuntimeException] {
      Scheduler.parMap(1 to 4, 2)(i => if (i == 3) throw new RuntimeException("boom") else i)
    }
  }

  test("metrics counts and timings line up") {
    val m = new Metrics
    m.timeSplit(Thread.sleep(5))
    m.timeSplit(Thread.sleep(5))
    m.timeMessage(Thread.sleep(5))
    val s = m.snapshot
    assert(s.splitQueries == 2 && s.messageQueries == 1)
    assert(s.splitMs.size == 2 && s.splitMs.forall(_ >= 4))
  }

  test("metrics reset clears everything") {
    val m = new Metrics
    m.timeSplit(())
    m.cacheHit(); m.cacheMiss()
    m.reset()
    val s = m.snapshot
    assert(s.splitQueries == 0 && s.cacheHits == 0 && s.cacheMisses == 0 && s.splitMs.isEmpty)
  }

  test("latency histogram buckets cover all samples") {
    val s = MetricsSnapshot(0, 0, 0, 0, Vector.empty, Vector(1, 5, 60, 150, 9999))
    val h = s.histogram(s.splitMs)
    assert(h.map(_._2).sum == 5)
    assert(h.head._1 == "<=10ms" && h.head._2 == 2)
    assert(h.last._1 == ">5000ms" && h.last._2 == 1)
  }

  test("message cache LRU evicts beyond capacity") {
    import spark.implicits._
    val cache = new MessageCache(CacheMode.Shared, maxEntries = 2)
    def df(i: Int) = Seq(i).toDF("x")
    cache.getOrCompute("a")(df(1))
    cache.getOrCompute("b")(df(2))
    cache.getOrCompute("c")(df(3))
    assert(cache.size == 2)
  }

  test("cache Off mode stores nothing") {
    import spark.implicits._
    val cache = new MessageCache(CacheMode.Off)
    cache.getOrCompute("a")(Seq(1).toDF("x"))
    assert(cache.size == 0)
  }
}
