package repro.fd

import scala.collection.mutable
import repro.fd.{AttrSet => AS}

/** FUN-style miner (Novelli & Cicchetti, ICDT 2001).
  *
  * Level-wise search driven by cardinality counts `|π_X|` instead of
  * partition refinement: `X → a` holds iff `|π_X| = |π_{X∪{a}}|`. Only
  * *free* sets (no `a ∈ X` with `|π_X| = |π_{X\{a}}|`) are extended — the
  * LHS of a minimal FD is always free — and cardinalities of non-free
  * subsets are deduced from discovered FDs rather than recounted, FUN's
  * central trick.
  */
object Fun extends Miner {
  val name = "FUN"

  def mine(table: EncodedTable, deadline: Deadline = Deadline.never): Set[FD] = {
    val k = table.width
    if (k == 0) return Set.empty
    val store = new PartitionStore(table)
    val out   = mutable.Set.empty[FD] // local-index FDs

    val card = mutable.Map[AS.T, Int](AS.empty -> math.min(1, table.nRows))

    // Deduced cardinality: if a discovered FD W→a has W ⊆ X\{a}, a ∈ X then
    // |π_X| = |π_{X\{a}}|. Falls back to counting via partitions.
    def cardOf(x: AS.T): Int = card.getOrElseUpdate(x, {
      out.collectFirst {
        case FD(w, a) if AS.contains(x, a) && AS.subsetOf(w, AS.remove(x, a)) =>
          cardOf(AS.remove(x, a))
      }.getOrElse(store(x).cardinality)
    })

    def emit(lhs: AS.T, rhs: Int): Unit = {
      val d = FD(lhs, rhs)
      if (!FDSet.subsumedBy(out, d)) out += d
    }

    val n = table.nRows
    // Level 1: constant columns give ∅→a; keys give a→everything.
    var level: IndexedSeq[AS.T] = (0 until k).map(AS.single)
    while (level.nonEmpty) {
      deadline.check(name)
      val freeNonKeys = mutable.ArrayBuffer.empty[AS.T]
      level.foreach { x =>
        val cx   = cardOf(x)
        var free = true
        AS.foreach(x) { a =>
          if (cardOf(AS.remove(x, a)) == cx) {
            emit(AS.remove(x, a), a)
            free = false
          }
        }
        if (free) {
          if (cx == n && n > 1) {
            // X is a key: determines every attribute outside X.
            (0 until k).foreach(b => if (!AS.contains(x, b)) emit(x, b))
          } else freeNonKeys += x
        }
      }
      // Extend every free non-key set with every absent attribute; a set may
      // be generated from several parents — dedupe.
      val next = mutable.LinkedHashSet.empty[AS.T]
      freeNonKeys.foreach { x =>
        (0 until k).foreach { b => if (!AS.contains(x, b)) next += AS.add(x, b) }
      }
      level = next.toIndexedSeq
    }

    FDSet.minimize(out).map(table.globalize)
  }
}
