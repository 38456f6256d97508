package repro.baselines

import repro.store.{ColumnStore, IndexResult, MultiDimIndex, RangeQuery, Scan}

/** Baseline 1 (paper §7.2): visit every point, accessing only the columns
  * present in the query filter.
  */
final class FullScan(store: ColumnStore, aggDim: Int = 0) extends MultiDimIndex {
  val name = "Full Scan"
  val buildNanos = 0L
  val sizeBytes = 0L

  def query(q: RangeQuery): IndexResult = {
    val t0 = System.nanoTime()
    val (count, sum) = Scan.scanRange(store, q, q.filteredDims, aggDim, 0, store.numRows)
    val t1 = System.nanoTime()
    IndexResult(count, sum, store.numRows.toLong, 0L, t1 - t0)
  }
}
