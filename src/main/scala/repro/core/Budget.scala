package repro.core

/** Resource budgets standing in for the paper's 24 h timeout and 512 GB
  * server (Implementation Setup, Section 4.1).
  *
  * `deadlineMs` is absolute wall-clock; algorithms with driver-side search
  * loops poll [[checkTime]]. `maxCells` bounds the number of candidate-cell
  * entries an algorithm may materialize — HoloClean's domain generation
  * trips it on large Tax subsets, reproducing the paper's `n/a*` (OOM)
  * cells without actually exhausting the heap.
  */
final case class Budget(deadlineMs: Long = Long.MaxValue, maxCells: Long = Long.MaxValue) {

  /** Throws [[BudgetExceeded]] when past the deadline. */
  def checkTime(what: String): Unit =
    if (System.currentTimeMillis() > deadlineMs) throw new BudgetExceeded(what)

  /** Throws [[SimulatedOOM]] when `cells` exceeds the memory budget. */
  def checkCells(cells: Long, what: String): Unit =
    if (cells > maxCells) throw new SimulatedOOM(s"$what: $cells cells > $maxCells")
}

object Budget {
  val unlimited: Budget = Budget()

  /** Budget expiring `ms` from now. */
  def timeLimit(ms: Long): Budget = Budget(deadlineMs = System.currentTimeMillis() + ms)
}

/** Raised when an algorithm exceeds its wall-clock or search budget —
  * reported as "n/a" in the tables, like the paper's 24 h timeouts.
  */
final class BudgetExceeded(msg: String) extends RuntimeException(msg)

/** Raised when an algorithm would materialize more state than the memory
  * budget allows — reported as "n/a*" like HoloClean's OOM in Table 6.
  */
final class SimulatedOOM(msg: String) extends RuntimeException(msg)
