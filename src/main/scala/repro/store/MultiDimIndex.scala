package repro.store

/** Result of a single index query, carrying the statistics the paper's
  * Table 2 reports:
  *   - `count`      matching points (the COUNT aggregate);
  *   - `sum`        SUM of the aggregation column over matching points;
  *   - `scanned`    points the index visited (`N_s`), so
  *                  `scanned/count` is the scan overhead SO;
  *   - `indexNanos` time in projection/refinement/traversal (IT);
  *   - `scanNanos`  time spent scanning (ST).
  */
final case class IndexResult(
    count: Long,
    sum: Long,
    scanned: Long,
    indexNanos: Long,
    scanNanos: Long
) {
  def totalNanos: Long = indexNanos + scanNanos
  def scanOverhead: Double = scanned.toDouble / math.max(1L, count).toDouble
  def timePerScanNs: Double = scanNanos.toDouble / math.max(1L, scanned).toDouble
}

/** Common interface of Flood and every baseline (paper §7.2): an index is
  * built once over a `ColumnStore` and answers conjunctive range-filter
  * aggregation queries. All indexes share the same store and scan code so
  * their timings are comparable.
  */
trait MultiDimIndex {

  /** Display name used in the reproduced tables. */
  def name: String

  /** Answer `q` with a COUNT (and SUM over `aggDim`) aggregation. */
  def query(q: RangeQuery): IndexResult

  /** Index metadata size in bytes (excluding the data itself). */
  def sizeBytes: Long

  /** Wall-clock build time in nanoseconds (Table 4). */
  def buildNanos: Long
}

/** Shared scanning kernels. Every index funnels its candidate physical
  * ranges through these loops, so per-point scan cost is identical across
  * indexes — differences in Table 2 then reflect layout quality, as in the
  * paper.
  */
object Scan {

  /** Scan `[s,e)` of `store`, counting and summing rows that pass the checks
    * in `checkDims` (a subset of the query's filtered dimensions — callers
    * drop dimensions already guaranteed by the index, e.g. Flood's sort
    * dimension after refinement).
    * Returns (count, sum).
    */
  def scanRange(
      store: ColumnStore,
      q: RangeQuery,
      checkDims: Array[Int],
      aggDim: Int,
      s: Int,
      e: Int
  ): (Long, Long) = {
    val agg = store.columns(aggDim)
    var count = 0L
    var sum = 0L
    if (checkDims.isEmpty) {
      var i = s
      while (i < e) { sum += agg(i); i += 1 }
      count = (e - s).toLong
    } else {
      val nd = checkDims.length
      var i = s
      while (i < e) {
        var ok = true
        var j = 0
        while (ok && j < nd) {
          val d = checkDims(j)
          val v = store(d, i)
          if (v < q.lo(d) || v > q.hi(d)) ok = false
          j += 1
        }
        if (ok) { count += 1; sum += agg(i) }
        i += 1
      }
    }
    (count, sum)
  }

  /** Ground-truth COUNT/SUM by brute force — the oracle for property tests. */
  def brute(store: ColumnStore, q: RangeQuery, aggDim: Int = 0): (Long, Long) =
    scanRange(store, q, q.filteredDims, aggDim, 0, store.numRows)
}
