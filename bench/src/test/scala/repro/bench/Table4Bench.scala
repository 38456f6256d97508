package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.tables.TableGen

/** Reproduces paper Table 4: index creation time — Flood's learning plus
  * loading time against every baseline's build time.
  */
class Table4Bench extends AnyFunSuite {

  test("Table 4: index creation time") {
    val runs = BenchShared.runs
    BenchShared.save("table4.txt", TableGen.table4(runs))

    for (run <- runs) {
      assert(run.floodLearnSec > 0 && run.floodLoadSec > 0, run.dataset.name)
      val byName = run.metrics.map(m => m.name -> m).toMap
      // paper shape: the clustered index builds fastest (one sort, no grid);
      // Flood's total creation time is competitive with the multi-dim
      // baselines (within an order of magnitude of the slowest tree build)
      val floodTotal = run.floodLearnSec + run.floodLoadSec
      val slowest = run.metrics
        .filter(m => m.name != "Flood" && m.name != "Full Scan" && !m.buildSec.isNaN)
        .map(_.buildSec).max
      assert(floodTotal < slowest * 20,
        s"${run.dataset.name}: Flood total $floodTotal vs slowest baseline $slowest")
    }
  }
}
