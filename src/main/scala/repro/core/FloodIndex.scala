package repro.core

import repro.model.{Plm, SearchUtil}
import repro.store.{ColumnStore, IndexResult, MultiDimIndex, RangeQuery, Scan}

import scala.collection.mutable.ArrayBuffer

/** Per-query statistics, decomposed the way the paper's cost model is
  * (Eq. 1): projection visits `cellsInRect` cells, refinement narrows each
  * non-empty cell, scanning touches `scanned` points of which `exactPoints`
  * lie in exact sub-ranges (no per-point filter checks).
  */
final case class FloodStats(
    count: Long,
    sum: Long,
    scanned: Long,
    exactPoints: Long,
    cellsInRect: Long,
    nonEmptyCells: Long,
    projectionNanos: Long,
    refineNanos: Long,
    scanNanos: Long,
    refined: Boolean
) {
  def toIndexResult: IndexResult =
    IndexResult(count, sum, scanned, projectionNanos + refineNanos, scanNanos)
}

/** Flood: the learned multi-dimensional in-memory index (paper §3–§5).
  *
  * The first `d-1` dimensions of `layout.order` form a grid whose columns are
  * spaced by `flattening` (learned CDFs in the full system); the last
  * dimension sorts points within each cell. Queries are answered by
  * projection (find intersecting cells), refinement (narrow each cell's
  * physical range on the sort dimension via a per-cell PLM + exponential
  * search), and scan (count/sum points, skipping filter checks inside exact
  * sub-ranges and answering exact ranges from prefix sums — §7.1).
  *
  * @param store      input data (any row order)
  * @param layout     dimension ordering + per-grid-dimension column counts
  * @param flattening monotone per-dimension value→[0,1] maps
  * @param aggDim     dimension whose SUM the queries aggregate
  * @param usePlm     refine with per-cell PLMs (else plain binary search)
  * @param plmDelta   PLM average-error budget δ (paper §7.8 picks 50)
  */
final class FloodIndex(
    store: ColumnStore,
    val layout: Layout,
    val flattening: Flattening,
    aggDim: Int = 0,
    usePlm: Boolean = true,
    plmDelta: Double = 50.0
) extends MultiDimIndex {
  require(layout.d == store.numDims, "layout must cover every dimension")
  require(layout.numCells <= (1L << 22), s"cell count ${layout.numCells} too large")

  val name = "Flood"

  private val d = layout.d
  private val gDims = layout.gridDims
  private val gCols = layout.cols
  private val sDim = layout.sortDim
  private val strides = layout.strides
  private val numCells = layout.numCells.toInt

  private var dataV: ColumnStore = _
  private var cellStart: Array[Int] = _
  private var cellMin: Array[Long] = _ // numCells * d, row-major by cell
  private var cellMax: Array[Long] = _
  private var plms: Array[Plm] = _
  private var aggPrefix: Array[Long] = _

  val buildNanos: Long = {
    val t0 = System.nanoTime()
    build()
    System.nanoTime() - t0
  }

  /** The reordered store (cells contiguous, sorted by sort dim within). */
  def data: ColumnStore = dataV

  /** Physical start of each cell (length numCells + 1). */
  def cellTable: Array[Int] = cellStart

  private def cellOf(row: Int): Int = {
    var id = 0L
    var i = 0
    while (i < gDims.length) {
      id += flattening.colOf(gDims(i), store(gDims(i), row), gCols(i)) * strides(i)
      i += 1
    }
    id.toInt
  }

  private def build(): Unit = {
    val n = store.numRows
    val cellIds = new Array[Int](n)
    var i = 0
    while (i < n) { cellIds(i) = cellOf(i); i += 1 }

    // counting sort by cell id (stable)
    val counts = new Array[Int](numCells + 1)
    i = 0
    while (i < n) { counts(cellIds(i) + 1) += 1; i += 1 }
    i = 1
    while (i <= numCells) { counts(i) += counts(i - 1); i += 1 }
    cellStart = counts.clone()
    val perm = new Array[Int](n)
    val cursor = new Array[Int](numCells)
    i = 0
    while (i < n) {
      val c = cellIds(i)
      perm(cellStart(c) + cursor(c)) = i
      cursor(c) += 1
      i += 1
    }

    // sort each cell's rows by the sort dimension
    val sortCol = store.columns(sDim)
    var c = 0
    while (c < numCells) {
      val s = cellStart(c); val e = cellStart(c + 1)
      if (e - s > 1) {
        val slice = java.util.Arrays.copyOfRange(perm, s, e)
        val boxed = slice.map(Int.box)
        java.util.Arrays.sort(boxed, (a: Integer, b: Integer) => java.lang.Long.compare(sortCol(a), sortCol(b)))
        var j = 0
        while (j < boxed.length) { perm(s + j) = boxed(j); j += 1 }
      }
      c += 1
    }

    dataV = store.reorder(perm)

    // per-cell per-dimension min/max (exactness checks) + per-cell PLMs
    cellMin = Array.fill(numCells * d)(Long.MaxValue)
    cellMax = Array.fill(numCells * d)(Long.MinValue)
    c = 0
    while (c < numCells) {
      val s = cellStart(c); val e = cellStart(c + 1)
      var dd = 0
      while (dd < d) {
        val col = dataV.columns(dd)
        var mn = Long.MaxValue; var mx = Long.MinValue
        var j = s
        while (j < e) { val v = col(j); if (v < mn) mn = v; if (v > mx) mx = v; j += 1 }
        cellMin(c * d + dd) = mn
        cellMax(c * d + dd) = mx
        dd += 1
      }
      c += 1
    }

    plms = new Array[Plm](numCells)
    if (usePlm) {
      val sorted = dataV.columns(sDim)
      c = 0
      while (c < numCells) {
        val s = cellStart(c); val e = cellStart(c + 1)
        if (e - s >= 32) plms(c) = Plm.build(sorted, s, e, plmDelta)
        c += 1
      }
    }

    aggPrefix = dataV.prefixSums(aggDim)
  }

  /** Answer `q`, reporting the full per-phase statistics. */
  def queryWithStats(q: RangeQuery): FloodStats = {
    // ---- projection: intersecting column ranges per grid dimension ----
    val t0 = System.nanoTime()
    val g = gDims.length
    val cLo = new Array[Int](g)
    val cHi = new Array[Int](g)
    var i = 0
    var nCellsInRect = 1L
    while (i < g) {
      val dim = gDims(i)
      if (q.filters(dim)) {
        cLo(i) = flattening.colOf(dim, q.lo(dim), gCols(i))
        cHi(i) = flattening.colOf(dim, q.hi(dim), gCols(i))
      } else { cLo(i) = 0; cHi(i) = gCols(i) - 1 }
      nCellsInRect *= (cHi(i) - cLo(i) + 1)
      i += 1
    }
    // enumerate intersecting cells (odometer over coordinate ranges)
    val cellList = new ArrayBuffer[Int]()
    if (g == 0) cellList += 0
    else {
      val coord = cLo.clone()
      var done = false
      while (!done) {
        var id = 0L
        var k = 0
        while (k < g) { id += coord(k) * strides(k); k += 1 }
        val c = id.toInt
        if (cellStart(c + 1) > cellStart(c)) cellList += c
        // increment odometer
        k = g - 1
        var carry = true
        while (carry && k >= 0) {
          coord(k) += 1
          if (coord(k) > cHi(k)) { coord(k) = cLo(k); k -= 1 } else carry = false
        }
        if (carry) done = true
      }
    }
    val t1 = System.nanoTime()

    // ---- refinement: narrow each cell's physical range on the sort dim ----
    val sortFiltered = q.filters(sDim)
    val sortCol = dataV.columns(sDim)
    val nCells = cellList.length
    val rs = new Array[Int](nCells)
    val re = new Array[Int](nCells)
    val checkMasks = new Array[Array[Int]](nCells)
    val qf = q.filteredDims
    i = 0
    while (i < nCells) {
      val c = cellList(i)
      var s = cellStart(c)
      var e = cellStart(c + 1)
      if (sortFiltered) {
        val plm = plms(c)
        if (plm != null) {
          val g1 = s + plm.predict(q.lo(sDim))
          s = SearchUtil.lowerBoundRange(sortCol, q.lo(sDim), g1, s, e)
          if (s < e) {
            val g2 = cellStart(c) + plm.predict(q.hi(sDim))
            e = SearchUtil.upperBoundRange(sortCol, q.hi(sDim), g2, s, e)
          }
        } else {
          s = SearchUtil.binaryLowerBound(sortCol, q.lo(sDim), s, e)
          if (s < e) e = SearchUtil.binaryUpperBound(sortCol, q.hi(sDim), s, e)
        }
      }
      rs(i) = s; re(i) = e
      if (s < e) {
        // dims still needing per-point checks: filtered dims that are neither
        // the (refined-exact) sort dim nor fully-contained in this cell
        var nCheck = 0
        val tmp = new Array[Int](qf.length)
        var j = 0
        while (j < qf.length) {
          val dim = qf(j)
          if (dim != sDim) {
            val exact = cellMin(c * d + dim) >= q.lo(dim) && cellMax(c * d + dim) <= q.hi(dim)
            if (!exact) { tmp(nCheck) = dim; nCheck += 1 }
          }
          j += 1
        }
        checkMasks(i) = java.util.Arrays.copyOf(tmp, nCheck)
      }
      i += 1
    }
    val t2 = System.nanoTime()

    // ---- scan ----
    var count = 0L
    var sum = 0L
    var scanned = 0L
    var exactPts = 0L
    i = 0
    while (i < nCells) {
      val s = rs(i); val e = re(i)
      if (s < e) {
        val checks = checkMasks(i)
        if (checks.isEmpty) {
          // exact sub-range: answer from prefix sums, no data access (§7.1)
          val len = (e - s).toLong
          count += len
          sum += aggPrefix(e) - aggPrefix(s)
          scanned += len
          exactPts += len
        } else {
          val (cc, ss) = Scan.scanRange(dataV, q, checks, aggDim, s, e)
          count += cc; sum += ss
          scanned += (e - s).toLong
        }
      }
      i += 1
    }
    val t3 = System.nanoTime()

    FloodStats(
      count = count, sum = sum, scanned = scanned, exactPoints = exactPts,
      cellsInRect = nCellsInRect, nonEmptyCells = nCells.toLong,
      projectionNanos = t1 - t0, refineNanos = t2 - t1, scanNanos = t3 - t2,
      refined = sortFiltered
    )
  }

  def query(q: RangeQuery): IndexResult = queryWithStats(q).toIndexResult

  def sizeBytes: Long = {
    var plmBytes = 0L
    var i = 0
    while (i < plms.length) { if (plms(i) != null) plmBytes += plms(i).sizeBytes; i += 1 }
    cellStart.length.toLong * 4 + cellMin.length.toLong * 16 + plmBytes + flattening.sizeBytes
  }

  /** PLM metadata share of the index size (paper: >95% of Flood's space). */
  def plmBytes: Long = plms.iterator.filter(_ != null).map(_.sizeBytes).sum
}
