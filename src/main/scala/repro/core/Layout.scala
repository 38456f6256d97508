package repro.core

/** A Flood layout `L = (O, {c_i})` (paper §4.1): `order` is a permutation of
  * the dataset's dimensions whose *last* entry is the sort dimension; the
  * first `d-1` entries form the grid, with `cols(i)` columns for dimension
  * `order(i)`.
  */
final case class Layout(order: Array[Int], cols: Array[Int]) {
  require(order.length == cols.length + 1, "cols must cover all but the sort dimension")
  require(order.distinct.length == order.length, "order must be a permutation")
  require(cols.forall(_ >= 1), "each grid dimension needs at least one column")

  /** Total number of dimensions. */
  def d: Int = order.length

  /** The sort dimension (last in the ordering). */
  def sortDim: Int = order(d - 1)

  /** The grid dimensions, in order. */
  def gridDims: Array[Int] = order.take(d - 1)

  /** Total number of grid cells. */
  def numCells: Long = cols.foldLeft(1L)(_ * _)

  /** Mixed-radix strides: `cellId = Σ coord(i) * stride(i)`; the first grid
    * dimension is most significant, matching the paper's depth-first cell
    * traversal order.
    */
  def strides: Array[Long] = {
    val s = new Array[Long](cols.length)
    var acc = 1L
    var i = cols.length - 1
    while (i >= 0) { s(i) = acc; acc *= cols(i); i -= 1 }
    s
  }

  override def toString: String =
    s"Layout(grid=${gridDims.zip(cols).map { case (d, c) => s"d$d×$c" }.mkString(",")}, sort=d$sortDim)"
}

object Layout {

  /** A uniform default: given a dimension ordering, give every grid dimension
    * the same number of columns so the total cell count is ~`targetCells`.
    */
  def uniform(order: Array[Int], targetCells: Long): Layout = {
    val g = order.length - 1
    val c =
      if (g == 0) Array.empty[Int]
      else {
        val per = math.max(1, math.round(math.pow(targetCells.toDouble, 1.0 / g)).toInt)
        Array.fill(g)(per)
      }
    Layout(order, c)
  }
}
