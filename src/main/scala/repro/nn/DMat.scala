package repro.nn

/** Row-major dense matrix of doubles.
  *
  * The minimal linear-algebra substrate for the GNN layers: training
  * (autodiff in [[AD]]) and inference ([[repro.core.GasLayer]]) both build
  * on it. Deliberately tiny and allocation-explicit — all shapes in this
  * reproduction are small enough (≤ a few 10^5 rows × ≤ few hundred cols)
  * that naive loops are fine and easy to verify.
  */
final class DMat(val rows: Int, val cols: Int, val a: Array[Double]) extends Serializable {
  require(a.length == rows.toLong * cols, s"bad shape ${rows}x$cols for array of ${a.length}")

  @inline def apply(i: Int, j: Int): Double = a(i * cols + j)
  @inline def update(i: Int, j: Int, v: Double): Unit = a(i * cols + j) = v

  /** A defensive copy of row `i`. */
  def row(i: Int): Array[Double] = java.util.Arrays.copyOfRange(a, i * cols, (i + 1) * cols)

  /** All rows as fresh arrays. */
  def toRows: Array[Array[Double]] = Array.tabulate(rows)(row)

  def copy: DMat = new DMat(rows, cols, a.clone())

  /** Matrix product `this * b` (naive ikj loop). */
  def matmul(b: DMat): DMat = {
    require(cols == b.rows, s"matmul shape mismatch: ${rows}x$cols * ${b.rows}x${b.cols}")
    val out = new Array[Double](rows * b.cols)
    var i = 0
    while (i < rows) {
      var k = 0
      while (k < cols) {
        val aik = a(i * cols + k)
        if (aik != 0.0) {
          val bOff = k * b.cols
          val oOff = i * b.cols
          var j = 0
          while (j < b.cols) { out(oOff + j) += aik * b.a(bOff + j); j += 1 }
        }
        k += 1
      }
      i += 1
    }
    new DMat(rows, b.cols, out)
  }

  def t: DMat = {
    val out = new Array[Double](rows * cols)
    var i = 0
    while (i < rows) { var j = 0; while (j < cols) { out(j * rows + i) = a(i * cols + j); j += 1 }; i += 1 }
    new DMat(cols, rows, out)
  }

  def +(b: DMat): DMat = zipWith(b, _ + _)
  def -(b: DMat): DMat = zipWith(b, _ - _)
  /** Element-wise (Hadamard) product. */
  def hadamard(b: DMat): DMat = zipWith(b, _ * _)

  def zipWith(b: DMat, f: (Double, Double) => Double): DMat = {
    require(rows == b.rows && cols == b.cols, s"shape mismatch ${rows}x$cols vs ${b.rows}x${b.cols}")
    val out = new Array[Double](a.length)
    var i = 0
    while (i < a.length) { out(i) = f(a(i), b.a(i)); i += 1 }
    new DMat(rows, cols, out)
  }

  def map(f: Double => Double): DMat = {
    val out = new Array[Double](a.length)
    var i = 0
    while (i < a.length) { out(i) = f(a(i)); i += 1 }
    new DMat(rows, cols, out)
  }

  def scale(c: Double): DMat = map(_ * c)

  def addInPlace(b: DMat): Unit = {
    require(rows == b.rows && cols == b.cols, "addInPlace shape mismatch")
    var i = 0
    while (i < a.length) { a(i) += b.a(i); i += 1 }
  }

  /** Broadcast-add a 1×cols row vector to every row. */
  def addRowVec(v: DMat): DMat = {
    require(v.rows == 1 && v.cols == cols, s"addRowVec wants 1x$cols, got ${v.rows}x${v.cols}")
    val out = a.clone()
    var i = 0
    while (i < rows) { var j = 0; while (j < cols) { out(i * cols + j) += v.a(j); j += 1 }; i += 1 }
    new DMat(rows, cols, out)
  }

  /** Column sums as a 1×cols matrix. */
  def colSum: DMat = {
    val out = new Array[Double](cols)
    var i = 0
    while (i < rows) { var j = 0; while (j < cols) { out(j) += a(i * cols + j); j += 1 }; i += 1 }
    new DMat(1, cols, out)
  }

  def sumAll: Double = { var s = 0.0; var i = 0; while (i < a.length) { s += a(i); i += 1 }; s }

  /** Select rows by index (duplicates allowed). */
  def selectRows(idx: Array[Int]): DMat = {
    val out = new Array[Double](idx.length * cols)
    var e = 0
    while (e < idx.length) {
      System.arraycopy(a, idx(e) * cols, out, e * cols, cols)
      e += 1
    }
    new DMat(idx.length, cols, out)
  }

  def maxAbsDiff(b: DMat): Double = {
    require(rows == b.rows && cols == b.cols, "maxAbsDiff shape mismatch")
    var m = 0.0
    var i = 0
    while (i < a.length) { val d = math.abs(a(i) - b.a(i)); if (d > m) m = d; i += 1 }
    m
  }

  override def toString: String =
    s"DMat(${rows}x$cols, ${a.take(8).map(v => f"$v%.4f").mkString(",")}${if (a.length > 8) ",…" else ""})"
}

object DMat {
  def zeros(rows: Int, cols: Int): DMat = new DMat(rows, cols, new Array[Double](rows * cols))

  def full(rows: Int, cols: Int, v: Double): DMat = {
    val a = new Array[Double](rows * cols); java.util.Arrays.fill(a, v); new DMat(rows, cols, a)
  }

  def eye(n: Int): DMat = {
    val m = zeros(n, n); var i = 0; while (i < n) { m(i, i) = 1.0; i += 1 }; m
  }

  /** Seeded Gaussian init (mean 0, given std). Deterministic in (shape, seed). */
  def randn(rows: Int, cols: Int, std: Double, seed: Long): DMat = {
    val rng = new java.util.Random(seed)
    val a = new Array[Double](rows * cols)
    var i = 0
    while (i < a.length) { a(i) = rng.nextGaussian() * std; i += 1 }
    new DMat(rows, cols, a)
  }

  /** Glorot/Xavier normal init. */
  def glorot(fanIn: Int, fanOut: Int, seed: Long): DMat =
    randn(fanIn, fanOut, math.sqrt(2.0 / (fanIn + fanOut)), seed)

  def fromRows(rows: Seq[Array[Double]]): DMat = {
    require(rows.nonEmpty, "fromRows needs at least one row")
    val c = rows.head.length
    val out = new Array[Double](rows.length * c)
    var i = 0
    rows.foreach { r =>
      require(r.length == c, "ragged rows")
      System.arraycopy(r, 0, out, i * c, c); i += 1
    }
    new DMat(rows.length, c, out)
  }

  def rowVec(v: Array[Double]): DMat = new DMat(1, v.length, v.clone())
}
