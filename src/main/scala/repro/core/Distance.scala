package repro.core

/** A distance function over dense float vectors.
  *
  * `apply` returns a *comparable* distance: monotone in the true metric but
  * not necessarily equal to it (Euclidean uses the squared distance, saving
  * the sqrt on the hot path — ordering, and hence recall, is unchanged).
  */
sealed trait Distance extends Serializable {
  /** Stable name used in serialized index metadata. */
  def name: String
  def apply(a: Array[Float], b: Array[Float]): Double
}

object Distance {

  /** Squared Euclidean distance. */
  case object Euclidean extends Distance {
    val name = "l2"
    def apply(a: Array[Float], b: Array[Float]): Double = Vectors.l2sq(a, b)
  }

  /** Cosine distance (1 − cosine similarity). */
  case object Cosine extends Distance {
    val name = "cosine"
    def apply(a: Array[Float], b: Array[Float]): Double = Vectors.cosineDist(a, b)
  }

  /** Resolve a distance by its serialized name. */
  def of(name: String): Distance = name match {
    case Euclidean.`name` => Euclidean
    case Cosine.`name`    => Cosine
    case other            => throw new IllegalArgumentException(s"unknown distance: $other")
  }
}
