package repro.core

/** Low-level dense float-vector kernels.
  *
  * Storage is `Array[Float]` (half the memory of doubles — the paper notes
  * most online storage is the embeddings); accumulation is in `Double` so
  * distance comparisons are stable.
  */
object Vectors {

  /** Squared Euclidean distance — monotone in L2, used for all ordering. */
  def l2sq(a: Array[Float], b: Array[Float]): Double = {
    require(a.length == b.length, s"dim mismatch: ${a.length} vs ${b.length}")
    var s = 0.0
    var i = 0
    while (i < a.length) {
      val d = a(i).toDouble - b(i).toDouble
      s += d * d
      i += 1
    }
    s
  }

  /** Dot product. */
  def dot(a: Array[Float], b: Array[Float]): Double = {
    require(a.length == b.length, s"dim mismatch: ${a.length} vs ${b.length}")
    var s = 0.0
    var i = 0
    while (i < a.length) { s += a(i).toDouble * b(i).toDouble; i += 1 }
    s
  }

  /** Euclidean norm. */
  def norm(a: Array[Float]): Double = math.sqrt(dot(a, a))

  /** Cosine distance, 1 − cos(a, b); zero vectors are at distance 1. */
  def cosineDist(a: Array[Float], b: Array[Float]): Double = {
    val na = norm(a); val nb = norm(b)
    if (na == 0.0 || nb == 0.0) 1.0
    else 1.0 - dot(a, b) / (na * nb)
  }

  /** Projection of `v` onto direction `h` (plain dot; `h` need not be unit). */
  def project(v: Array[Float], h: Array[Float]): Double = dot(v, h)

  /** Scale `a` to unit norm; returns a fresh array (zero vector unchanged). */
  def normalize(a: Array[Float]): Array[Float] = {
    val n = norm(a)
    if (n == 0.0) a.clone()
    else {
      val out = new Array[Float](a.length)
      var i = 0
      while (i < a.length) { out(i) = (a(i) / n).toFloat; i += 1 }
      out
    }
  }
}
