package repro.ml

/** Dense-vector primitives over `Array[Double]`.
  *
  * All model code (matcher head, committee members, k-means, indexes) works
  * on raw arrays for speed; these helpers keep that code readable. Methods
  * ending in `I` mutate their first argument in place.
  */
object Vec {

  def zeros(n: Int): Array[Double] = new Array[Double](n)

  def dot(a: Array[Double], b: Array[Double]): Double = {
    require(a.length == b.length, s"dot: ${a.length} vs ${b.length}")
    var s = 0.0; var i = 0
    while (i < a.length) { s += a(i) * b(i); i += 1 }
    s
  }

  /** a += alpha * b */
  def axpyI(a: Array[Double], alpha: Double, b: Array[Double]): Unit = {
    require(a.length == b.length, s"axpy: ${a.length} vs ${b.length}")
    var i = 0
    while (i < a.length) { a(i) += alpha * b(i); i += 1 }
  }

  def scaleI(a: Array[Double], alpha: Double): Unit = {
    var i = 0
    while (i < a.length) { a(i) *= alpha; i += 1 }
  }

  def add(a: Array[Double], b: Array[Double]): Array[Double] = {
    val r = a.clone(); axpyI(r, 1.0, b); r
  }

  def sub(a: Array[Double], b: Array[Double]): Array[Double] = {
    val r = a.clone(); axpyI(r, -1.0, b); r
  }

  /** Element-wise product. */
  def had(a: Array[Double], b: Array[Double]): Array[Double] = {
    require(a.length == b.length, s"had: ${a.length} vs ${b.length}")
    Array.tabulate(a.length)(i => a(i) * b(i))
  }

  def l2sq(a: Array[Double]): Double = dot(a, a)

  def l2(a: Array[Double]): Double = math.sqrt(l2sq(a))

  /** Squared euclidean distance — the paper's blocker similarity is its negation. */
  def distSq(a: Array[Double], b: Array[Double]): Double = {
    require(a.length == b.length, s"distSq: ${a.length} vs ${b.length}")
    var s = 0.0; var i = 0
    while (i < a.length) { val d = a(i) - b(i); s += d * d; i += 1 }
    s
  }

  def cosine(a: Array[Double], b: Array[Double]): Double = {
    val na = l2(a); val nb = l2(b)
    if (na == 0.0 || nb == 0.0) 0.0 else dot(a, b) / (na * nb)
  }

  def mean(vs: Seq[Array[Double]]): Array[Double] = {
    require(vs.nonEmpty, "mean of empty set")
    val r = zeros(vs.head.length)
    vs.foreach(v => axpyI(r, 1.0, v))
    scaleI(r, 1.0 / vs.size)
    r
  }

  def concat(vs: Array[Double]*): Array[Double] = {
    val r = new Array[Double](vs.map(_.length).sum)
    var off = 0
    vs.foreach { v => System.arraycopy(v, 0, r, off, v.length); off += v.length }
    r
  }

  def tanhI(a: Array[Double]): Unit = {
    var i = 0
    while (i < a.length) { a(i) = math.tanh(a(i)); i += 1 }
  }
}
