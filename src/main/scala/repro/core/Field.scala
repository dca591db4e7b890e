package repro.core

/** An n-dimensional scalar field stored row-major (last dimension fastest).
  *
  * This is the unit of work everywhere: predictors scan it, the sampler
  * samples it, Spark chunks carry a serialized `(dims, data)` pair of it.
  * Supports 1–4 dimensions, which covers every dataset in the paper's
  * Table I (HACC/Brown 1-D … EXAFEL 4-D).
  *
  * @param data flat values, length == dims.product
  * @param dims extent of each dimension, slowest-varying first
  */
final case class Field(data: Array[Double], dims: Array[Int]) {
  require(dims.nonEmpty && dims.length <= 4, s"1-4 dims supported, got ${dims.length}")
  require(dims.forall(_ > 0), "all dims must be positive")
  require(data.length == dims.product.toInt, s"data length ${data.length} != ${dims.mkString("x")}")

  /** Number of points. */
  def size: Int = data.length

  /** Number of dimensions. */
  def ndim: Int = dims.length

  /** Row-major strides: stride(i) = product of dims after i. */
  val strides: Array[Int] = {
    val s = new Array[Int](dims.length)
    var acc = 1
    var i = dims.length - 1
    while (i >= 0) { s(i) = acc; acc *= dims(i); i -= 1 }
    s
  }

  /** Linear index of the given coordinates (no bounds check beyond require). */
  def index(coords: Array[Int]): Int = {
    var idx = 0
    var i = 0
    while (i < coords.length) { idx += coords(i) * strides(i); i += 1 }
    idx
  }

  /** Coordinates of the given linear index. */
  def coords(idx: Int): Array[Int] = {
    val c = new Array[Int](dims.length)
    var rem = idx
    var i = 0
    while (i < dims.length) { c(i) = rem / strides(i); rem %= strides(i); i += 1 }
    c
  }

  /** Value at coordinates. */
  def apply(coords: Array[Int]): Double = data(index(coords))

  /** Minimum and maximum value. */
  def minMax: (Double, Double) = {
    var mn = Double.PositiveInfinity
    var mx = Double.NegativeInfinity
    var i = 0
    while (i < data.length) {
      val v = data(i)
      if (v < mn) mn = v
      if (v > mx) mx = v
      i += 1
    }
    (mn, mx)
  }

  /** Value range (max - min); 0 for constant fields. */
  def valueRange: Double = { val (mn, mx) = minMax; mx - mn }

  /** Mean of the field. */
  def mean: Double = {
    var s = 0.0; var i = 0
    while (i < data.length) { s += data(i); i += 1 }
    s / data.length
  }

  /** Population variance of the field. */
  def variance: Double = {
    val mu = mean
    var s = 0.0; var i = 0
    while (i < data.length) { val d = data(i) - mu; s += d * d; i += 1 }
    s / data.length
  }

  /** A structurally identical field with fresh (copied) data. */
  def copyField: Field = Field(data.clone(), dims)
}

object Field {
  /** Build a field of the given dims filled via the generator f(linearIndex). */
  def tabulate(dims: Array[Int])(f: Int => Double): Field = {
    val n = dims.product
    val a = new Array[Double](n)
    var i = 0
    while (i < n) { a(i) = f(i); i += 1 }
    Field(a, dims)
  }

  /** 1-D convenience constructor. */
  def of1d(data: Array[Double]): Field = Field(data, Array(data.length))
}
