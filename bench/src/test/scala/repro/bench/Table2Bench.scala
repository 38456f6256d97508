package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.tables.TableGen

/** Reproduces paper Table 2: the per-index performance breakdown (scan
  * overhead SO, time per scanned point TPS, scan time ST, index time IT,
  * total time TT) for all indexes on all four datasets, with every baseline
  * hand-tuned on the train workload and Flood trained automatically.
  */
class Table2Bench extends AnyFunSuite {

  test("Table 2: performance breakdown across all indexes and datasets") {
    val runs = BenchShared.runs
    BenchShared.save("table2.txt", TableGen.table2(runs))

    for (run <- runs) {
      val byName = run.metrics.map(m => m.name -> m).toMap
      val flood = byName("Flood")
      val full = byName("Full Scan")

      // paper: every index spends most time scanning; Flood's layout cuts
      // scan overhead far below a full scan
      assert(flood.so < full.so / 5,
        s"${run.dataset.name}: Flood SO ${flood.so} vs full ${full.so}")
      assert(flood.ttMs < full.ttMs,
        s"${run.dataset.name}: Flood TT ${flood.ttMs} vs full scan ${full.ttMs}")

      // paper: Flood is faster than or on-par with the best hand-tuned
      // baseline on every dataset ("optimality across the board"); allow 1.5x
      // slack for JVM timing noise at our reduced scale
      val bestBaseline = run.metrics.filter(m => m.name != "Flood" && !m.ttMs.isNaN).minBy(_.ttMs)
      assert(flood.ttMs <= bestBaseline.ttMs * 1.5,
        s"${run.dataset.name}: Flood ${flood.ttMs}ms vs best baseline " +
          s"${bestBaseline.name} ${bestBaseline.ttMs}ms")

      // sanity: SO >= 1 wherever defined
      for (m <- run.metrics if !m.so.isNaN) assert(m.so >= 1.0, s"${m.name} SO ${m.so}")
    }
  }
}
