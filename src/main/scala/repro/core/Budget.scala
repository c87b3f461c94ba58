package repro.core

/** Cooperative time budgets for long-running decompositions.
  *
  * The paper marks runs exceeding 4 days as INF; our harness mirrors that
  * with much smaller budgets. Engines take a ``deadlineNanos`` (absolute
  * ``System.nanoTime`` value; ``Long.MaxValue`` = unbounded) and poll
  * [[Budget.check]] at loop boundaries, throwing [[Budget.Exceeded]] —
  * cooperative cancellation, so no threads are leaked on timeout.
  */
object Budget {

  /** Thrown when a deadline passes; caught by the harness and reported INF. */
  final class Exceeded extends RuntimeException("time budget exceeded")

  /** Absolute deadline ``budgetMs`` from now. */
  def deadline(budgetMs: Long): Long =
    if (budgetMs == Long.MaxValue) Long.MaxValue else System.nanoTime() + budgetMs * 1000000L

  /** Throw [[Exceeded]] if ``deadlineNanos`` has passed. */
  def check(deadlineNanos: Long): Unit =
    if (deadlineNanos != Long.MaxValue && System.nanoTime() > deadlineNanos) throw new Exceeded
}
