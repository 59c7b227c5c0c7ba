package repro.core

/** Exact top-K search over an in-memory collection — the per-partition
  * kernel of the Spark brute-force search (§5.4) and the reference for
  * HNSW recall tests.
  */
object BruteForce {

  /** Exact top-`k` neighbors of `q` over `items`, sorted by ascending
    * distance with ties broken by id. Uses a bounded max-heap, O(n log k).
    */
  def topK(items: Iterable[(Long, Array[Float])], q: Array[Float], k: Int,
           distance: Distance): Array[Neighbor] = {
    require(k > 0, s"k must be positive, got $k")
    // max-heap on (dist, id) so the worst kept neighbor is on top
    val heap = new java.util.PriorityQueue[Neighbor](
      (a: Neighbor, b: Neighbor) => {
        val c = java.lang.Double.compare(b.dist, a.dist)
        if (c != 0) c else java.lang.Long.compare(b.id, a.id)
      })
    val it = items.iterator
    while (it.hasNext) {
      val (id, v) = it.next()
      val d = distance(q, v)
      if (heap.size < k) heap.add(Neighbor(id, d))
      else {
        val worst = heap.peek()
        if (d < worst.dist || (d == worst.dist && id < worst.id)) {
          heap.poll(); heap.add(Neighbor(id, d))
        }
      }
    }
    val out = new Array[Neighbor](heap.size)
    var i = out.length - 1
    while (i >= 0) { out(i) = heap.poll(); i -= 1 }
    out
  }
}
