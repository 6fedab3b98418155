package repro.fd

/** Time budget for a mining run. Benches cap the slow baselines (the paper
  * itself reports FastFDs as ">2,000 s"); an expired budget aborts the run
  * with [[MinerTimeout]], which the harness reports as a lower bound.
  */
final case class Deadline(atNanos: Long) {
  def expired: Boolean = System.nanoTime() >= atNanos
  def check(miner: String): Unit =
    if (expired) throw MinerTimeout(miner)
}

object Deadline {
  /** A deadline `seconds` from now; `None`-like infinite budget via [[never]]. */
  def in(seconds: Double): Deadline = Deadline(System.nanoTime() + (seconds * 1e9).toLong)
  val never: Deadline = Deadline(Long.MaxValue)
}

final case class MinerTimeout(miner: String)
  extends RuntimeException(s"$miner exceeded its time budget")

/** A complete exact-FD miner over an encoded instance. Implementations must
  * return exactly the minimal canonical FDs (with global attribute indices)
  * holding on the instance — cross-checked against each other and against
  * [[BruteMiner]] in the test suites.
  */
trait Miner {
  def name: String

  /** Mine all minimal canonical FDs (globalized via `table.attrIds`). */
  def mine(table: EncodedTable, deadline: Deadline = Deadline.never): Set[FD]
}
