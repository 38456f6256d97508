package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.tables.TableGen
import repro.workload.Datasets

/** Reproduces paper Table 1: dataset and query characteristics. */
class Table1Bench extends AnyFunSuite {

  test("Table 1: dataset and query characteristics") {
    val t = TableGen.table1(BenchShared.spark)
    BenchShared.save("table1.txt", "Table 1 (paper: 30M/300M/105M/230M records, 6/7/6/6 dims)\n" + t)
    // paper shape: four datasets, tpch has 7 dims, the rest 6
    for (n <- Datasets.Names) assert(t.nonEmpty)
    val dss = Datasets.Names.map(n => Datasets.load(BenchShared.spark, n, 1000))
    assert(dss.map(_.numDims) == Seq(6, 7, 6, 6))
  }
}
