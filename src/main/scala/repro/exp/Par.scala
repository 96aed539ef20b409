package repro.exp

import java.util.concurrent.Executors

import scala.concurrent.duration.Duration
import scala.concurrent.{Await, ExecutionContext, Future}

/** Bounded driver-side parallelism for independent per-site pipeline runs.
  *
  * Each run launches its own Spark jobs; running a few sites concurrently
  * overlaps their scheduling gaps without oversubscribing the executor
  * cores.  Results preserve input order, so table output stays stable.
  */
object Par {
  def map[A, B](items: Vector[A], parallelism: Int = 4)(f: A => B): Vector[B] = {
    val pool = Executors.newFixedThreadPool(parallelism)
    implicit val ec: ExecutionContext = ExecutionContext.fromExecutor(pool)
    try Await.result(Future.sequence(items.map(a => Future(f(a)))), Duration.Inf)
    finally pool.shutdown()
  }
}
