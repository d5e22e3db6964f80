package repro.core

/** Dense-vector helpers on raw `Array[Double]` — hot-path code shared by the
  * embedding models, SimHash, and the re-ranking stages. All methods are
  * allocation-free unless they must return a new vector.
  */
object VectorOps {

  def dot(a: Array[Double], b: Array[Double]): Double = {
    require(a.length == b.length, s"dim mismatch ${a.length} vs ${b.length}")
    var s = 0.0; var i = 0
    while (i < a.length) { s += a(i) * b(i); i += 1 }
    s
  }

  def norm(a: Array[Double]): Double = math.sqrt(dot(a, a))

  /** Cosine similarity; 0.0 when either vector is zero (never NaN). */
  def cosine(a: Array[Double], b: Array[Double]): Double = {
    val na = norm(a); val nb = norm(b)
    if (na == 0.0 || nb == 0.0) 0.0 else dot(a, b) / (na * nb)
  }

  /** In-place `a += b`. */
  def addInPlace(a: Array[Double], b: Array[Double]): Unit = {
    var i = 0
    while (i < a.length) { a(i) += b(i); i += 1 }
  }

  /** In-place scale. */
  def scaleInPlace(a: Array[Double], s: Double): Unit = {
    var i = 0
    while (i < a.length) { a(i) *= s; i += 1 }
  }

  /** Returns a fresh L2-normalized copy (zero vector stays zero). */
  def normalized(a: Array[Double]): Array[Double] = {
    val n = norm(a)
    if (n == 0.0) a.clone()
    else { val out = a.clone(); scaleInPlace(out, 1.0 / n); out }
  }

  /** Angle in radians between two vectors, clamped against FP drift. */
  def angle(a: Array[Double], b: Array[Double]): Double =
    math.acos(math.max(-1.0, math.min(1.0, cosine(a, b))))
}
