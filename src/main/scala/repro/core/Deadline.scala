package repro.core

/** Wall-clock run caps. The paper kills any algorithm after 30 minutes and
  * reports "did not finish"; the bench does the same at a smaller cap
  * (scaled with the ×0.1 data). Algorithms check the deadline inside their
  * hot loops and abort by throwing [[Deadline.Exceeded]].
  */
object Deadline {
  final class Exceeded extends RuntimeException("deadline exceeded")

  val None: Long = Long.MaxValue

  def in(millis: Long): Long = System.nanoTime() + millis * 1000000L

  @inline def check(deadlineNanos: Long): Unit =
    if (System.nanoTime() > deadlineNanos) throw new Exceeded
}
