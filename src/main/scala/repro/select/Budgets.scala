package repro.select

/** Wall-clock budget helpers for the search baselines. */
object Budgets {
  /** `t0 + millis` in nanos without overflowing for "unlimited" budgets. */
  def saturatingDeadline(t0Nanos: Long, budgetMillis: Long): Long =
    if (budgetMillis >= (Long.MaxValue - math.max(0L, t0Nanos)) / 1000000L) Long.MaxValue
    else t0Nanos + budgetMillis * 1000000L
}
