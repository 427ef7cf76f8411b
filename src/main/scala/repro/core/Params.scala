package repro.core

/** The MFG problem parameters: (τ_U, τ_V) biclique size constraints and the
  * frequency constraint λ (Definitions 2.3–2.6).
  */
final case class Params(tauU: Int, tauV: Int, lambda: Int) {
  require(tauU >= 1 && tauV >= 1 && lambda >= 1, s"parameters must be positive: $this")
}

/** Raised by enumerators when their time budget runs out (the paper reports
  * such runs as INF after 12 hours; the benches use smaller budgets).
  */
final class TimeBudgetExceeded(ms: Long) extends RuntimeException(s"time budget of ${ms}ms exceeded")

/** Cooperative time budget checked inside search recursions. */
final class Deadline(limitMs: Long) extends Serializable {
  private val startNanos = System.nanoTime()
  private var calls = 0L

  /** Cheap amortised check: samples the clock every 1024 calls. */
  def check(): Unit = {
    if (limitMs <= 0) return
    calls += 1
    if ((calls & 1023) == 0 && System.nanoTime() - startNanos > limitMs * 1000000L)
      throw new TimeBudgetExceeded(limitMs)
  }
}

object Deadline {
  /** No limit. */
  def unlimited: Deadline = new Deadline(0)
  def ms(limit: Long): Deadline = new Deadline(limit)
}

/** Mutable instrumentation counters shared by the enumerators.
  *
  * `cmNanos` is the Table 1 metric: time spent computing valid candidate
  * sets plus time spent verifying maximality ("FilterV-CM" / "VFree-CM").
  */
final class EnumStats extends Serializable {
  var nodes: Long = 0L          // search-tree nodes expanded
  var freqChecks: Long = 0L     // frequency verifications performed
  var cmNanos: Long = 0L        // candidate-set computation + maximality time
  var totalNanos: Long = 0L     // end-to-end enumeration time
  var filteredEdges: Long = 0L  // temporal edges surviving the graph filter
  var inputEdges: Long = 0L     // temporal edges before the graph filter

  def cmMs: Double = cmNanos / 1e6
  def totalMs: Double = totalNanos / 1e6
  def cmShare: Double = if (totalNanos == 0) 0.0 else cmNanos.toDouble / totalNanos
  def pruneRatio: Double = if (inputEdges == 0) 0.0 else 1.0 - filteredEdges.toDouble / inputEdges
}
