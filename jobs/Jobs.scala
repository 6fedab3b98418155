package repro.jobs

import repro.bench.Tables

/** spark-submit entrypoints, one per reproduced table. Scale factors and
  * time budgets come from the environment (MIMIC_SF, PTE_SF, PTC_SF,
  * TPCH_SF, BENCH_BUDGET_S) — see README.
  *
  * Example:
  *   spark-submit --class repro.jobs.TableIIIJob target/scala-2.13/repro_2.13-*.jar
  */
object TableIJob   { def main(args: Array[String]): Unit = { Tables.tableI(); sys.exit(0) } }
object TableIIJob  { def main(args: Array[String]): Unit = { Tables.tableII(); sys.exit(0) } }
object TableIIIJob { def main(args: Array[String]): Unit = { Tables.tableIII(); sys.exit(0) } }
object RuntimeJob  { def main(args: Array[String]): Unit = { Tables.runtimeTable(); sys.exit(0) } }
object MemoryJob   { def main(args: Array[String]): Unit = { Tables.memoryTable(); sys.exit(0) } }
object ProvenanceJob { def main(args: Array[String]): Unit = { Tables.provenanceBreakdown(); sys.exit(0) } }
