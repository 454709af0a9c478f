package repro.core

import java.util.concurrent.Executors
import scala.concurrent.duration.Duration
import scala.concurrent.{Await, ExecutionContext, Future}

/** Inter-query parallelism (paper §5.5.3): Spark accepts concurrent jobs
  * from multiple driver threads, so independent SQL queries (per-feature
  * split queries, per-tree RF training, independent messages) are driven
  * from a fixed-size pool. `parallelism <= 1` degrades to sequential
  * execution (the paper's "w/o" configuration).
  */
object Scheduler {

  def parMap[A, B](xs: Seq[A], parallelism: Int)(f: A => B): Seq[B] =
    if (parallelism <= 1 || xs.size <= 1) xs.map(f)
    else {
      val pool = Executors.newFixedThreadPool(math.min(parallelism, xs.size))
      implicit val ec: ExecutionContext = ExecutionContext.fromExecutor(pool)
      try {
        val futs = xs.map(x => Future(f(x)))
        Await.result(Future.sequence(futs), Duration.Inf)
      } finally pool.shutdown()
    }
}
