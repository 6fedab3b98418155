package repro.fd

import repro.fd.{AttrSet => AS}

/** Exponential reference miner: for every RHS, scan candidate LHSs in size
  * order and keep the minimal valid ones. Only used in tests (≤ ~10 attrs)
  * as the ground truth the real miners are validated against.
  */
object BruteMiner extends Miner {
  val name = "Brute"

  def mine(table: EncodedTable, deadline: Deadline = Deadline.never): Set[FD] = {
    val store = new PartitionStore(table)
    val all   = AS.universe(table.width)
    val out   = Set.newBuilder[FD]
    var rhs = 0
    while (rhs < table.width) {
      deadline.check(name)
      val candidates = AS.allSubsets(AS.remove(all, rhs)).sortBy(AS.size)
      val minimal    = scala.collection.mutable.ArrayBuffer.empty[AS.T]
      candidates.foreach { lhs =>
        if (!minimal.exists(m => AS.subsetOf(m, lhs)) && store.holds(lhs, rhs)) {
          minimal += lhs
          out += table.globalize(FD(lhs, rhs))
        }
      }
      rhs += 1
    }
    out.result()
  }
}
