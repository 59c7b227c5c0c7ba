package repro.core

import java.io.{DataInputStream, DataOutputStream, ByteArrayInputStream, ByteArrayOutputStream}
import scala.collection.mutable.ArrayBuffer

/** Tunable parameters of an HNSW index (Malkov & Yashunin 2016, §3 of the
  * LANNS paper).
  *
  * @param m              max connections per node on layers > 0; layer 0
  *                       allows 2·m (the standard maxM0 rule)
  * @param efConstruction beam width of the candidate search during insertion
  * @param efSearch       default beam width at query time (overridable per call)
  * @param seed           seed of the level-assignment RNG, so builds are
  *                       deterministic given an insertion order
  */
final case class HnswParams(
    m: Int = 16,
    efConstruction: Int = 100,
    efSearch: Int = 64,
    seed: Long = 42L,
)

/** A Hierarchical Navigable Small World graph index over dense float vectors.
  *
  * This is the per-(shard, segment) building block of LANNS: a multi-layer
  * proximity graph where each node gets a random maximum layer drawn from an
  * exponential distribution with scale 1/ln(m). Insertion greedily descends
  * from the entry point to the node's top layer, then runs a beam search of
  * width `efConstruction` on each layer downward, connecting the node to
  * neighbors chosen by the select-neighbors *heuristic* (Algorithm 4 of the
  * HNSW paper: a candidate is kept only if it is closer to the base point
  * than to every already-selected neighbor, which preserves graph
  * navigability in clustered data).
  *
  * Not thread-safe for writes; the LANNS indexer builds each index inside a
  * single Spark task. Searches after build are read-only and may be shared.
  */
final class HnswIndex private (
    val dim: Int,
    val distance: Distance,
    val params: HnswParams,
) extends Serializable {

  private val ids    = new ArrayBuffer[Long]
  private val vecs   = new ArrayBuffer[Array[Float]]
  private val levels = new ArrayBuffer[Int]
  // links(node)(layer) = internal ids of neighbors at that layer, 0..level(node)
  private val links  = new ArrayBuffer[Array[ArrayBuffer[Int]]]

  private var entry: Int    = -1
  private var topLevel: Int = -1

  private val rng = new java.util.Random(params.seed)
  private val mL  = 1.0 / math.log(math.max(2, params.m).toDouble)

  // Visited marking by stamp — O(1) clear between beam searches.
  private var visited      = new Array[Int](1024)
  private var visitStamp   = 0

  /** Number of indexed vectors. */
  def size: Int = ids.length

  /** External id of internal node `i` (test/introspection hook). */
  def idOf(i: Int): Long = ids(i)

  /** Level of internal node `i` (test/introspection hook). */
  def levelOf(i: Int): Int = levels(i)

  /** Current top layer of the hierarchy, −1 when empty. */
  def maxLevel: Int = topLevel

  /** Largest adjacency-list length over all (node, layer) pairs — bounded
    * by 2·m by construction (invariant-test hook).
    */
  def maxObservedDegree: Int = {
    var mx = 0
    var i = 0
    while (i < links.length) {
      val ls = links(i)
      var l = 0
      while (l < ls.length) { if (ls(l).length > mx) mx = ls(l).length; l += 1 }
      i += 1
    }
    mx
  }

  /** Number of nodes whose assigned level is ≥ `l` (level-distribution
    * test hook).
    */
  def countAtLevel(l: Int): Int = levels.count(_ >= l)

  private def dist(q: Array[Float], node: Int): Double = distance(q, vecs(node))

  private def newStamp(): Unit = {
    visitStamp += 1
    if (visited.length < ids.length) {
      val grown = new Array[Int](math.max(ids.length, visited.length * 2))
      System.arraycopy(visited, 0, grown, 0, visited.length)
      visited = grown
    }
  }

  private def maxDegree(layer: Int): Int = if (layer == 0) 2 * params.m else params.m

  /** Greedy descent: closest node to `q` on `layer` starting from `ep`. */
  private def greedyClosest(q: Array[Float], ep: Int, layer: Int): Int = {
    var cur  = ep
    var curD = dist(q, cur)
    var improved = true
    while (improved) {
      improved = false
      val nbrs = links(cur)(layer)
      var i = 0
      while (i < nbrs.length) {
        val n = nbrs(i)
        val d = dist(q, n)
        if (d < curD) { cur = n; curD = d; improved = true }
        i += 1
      }
    }
    cur
  }

  /** Beam search of width `ef` on `layer`; returns candidates sorted by
    * ascending distance (at most `ef`).
    */
  private def searchLayer(q: Array[Float], ep: Int, ef: Int, layer: Int): ArrayBuffer[(Int, Double)] = {
    newStamp()
    // candidates: min-heap by distance; result: max-heap by distance
    val cand = new java.util.PriorityQueue[(Int, Double)](
      (a: (Int, Double), b: (Int, Double)) => java.lang.Double.compare(a._2, b._2))
    val res = new java.util.PriorityQueue[(Int, Double)](
      (a: (Int, Double), b: (Int, Double)) => java.lang.Double.compare(b._2, a._2))

    val d0 = dist(q, ep)
    cand.add((ep, d0)); res.add((ep, d0)); visited(ep) = visitStamp

    while (!cand.isEmpty) {
      val (c, cd) = cand.poll()
      if (cd > res.peek()._2 && res.size >= ef) {
        cand.clear() // no candidate can improve the result set
      } else {
        val nbrs = links(c)(layer)
        var i = 0
        while (i < nbrs.length) {
          val n = nbrs(i)
          if (visited(n) != visitStamp) {
            visited(n) = visitStamp
            val d = dist(q, n)
            if (res.size < ef || d < res.peek()._2) {
              cand.add((n, d))
              res.add((n, d))
              if (res.size > ef) res.poll()
            }
          }
          i += 1
        }
      }
    }
    val out = new ArrayBuffer[(Int, Double)](res.size)
    while (!res.isEmpty) out += res.poll()
    // res drains largest-first; reverse to ascending
    var lo = 0; var hi = out.length - 1
    while (lo < hi) { val t = out(lo); out(lo) = out(hi); out(hi) = t; lo += 1; hi -= 1 }
    out
  }

  /** Select-neighbors heuristic (HNSW Algorithm 4) over `cands` sorted by
    * ascending distance to the base point: keep a candidate only if it is
    * closer to the base than to any already-kept neighbor; backfill with the
    * nearest pruned candidates if fewer than `m` survive.
    */
  private def selectHeuristic(cands: ArrayBuffer[(Int, Double)], m: Int): ArrayBuffer[Int] = {
    val kept   = new ArrayBuffer[Int]
    val pruned = new ArrayBuffer[Int]
    var i = 0
    while (i < cands.length && kept.length < m) {
      val (c, dc) = cands(i)
      var good = true
      var j = 0
      while (good && j < kept.length) {
        if (distance(vecs(c), vecs(kept(j))) < dc) good = false
        j += 1
      }
      if (good) kept += c else pruned += c
      i += 1
    }
    var p = 0
    while (kept.length < m && p < pruned.length) { kept += pruned(p); p += 1 }
    kept
  }

  /** Re-prune an overfull adjacency list back to the layer's degree cap. */
  private def shrink(node: Int, layer: Int): Unit = {
    val cap  = maxDegree(layer)
    val nbrs = links(node)(layer)
    if (nbrs.length > cap) {
      val scored = nbrs.map(n => (n, distance(vecs(node), vecs(n)))).sortBy(_._2)
      val kept   = selectHeuristic(scored, cap)
      nbrs.clear()
      nbrs ++= kept
    }
  }

  /** Insert one vector. Duplicate external ids are allowed (last wins at
    * merge time via distance ordering).
    */
  def add(id: Long, v: Array[Float]): Unit = {
    require(v.length == dim, s"vector dim ${v.length} != index dim $dim")
    val level = math.floor(-math.log(rng.nextDouble() + 1e-300) * mL).toInt
    val node  = ids.length
    ids += id; vecs += v; levels += level
    links += Array.fill(level + 1)(new ArrayBuffer[Int](maxDegree(0)))

    if (entry < 0) { entry = node; topLevel = level; return }

    var ep = entry
    var l  = topLevel
    while (l > level) { ep = greedyClosest(v, ep, l); l -= 1 }

    l = math.min(level, topLevel)
    while (l >= 0) {
      val cands     = searchLayer(v, ep, params.efConstruction, l)
      val neighbors = selectHeuristic(cands, maxDegree(l))
      var i = 0
      while (i < neighbors.length) {
        val n = neighbors(i)
        links(node)(l) += n
        links(n)(l) += node
        shrink(n, l)
        i += 1
      }
      ep = cands.head._1
      l -= 1
    }

    if (level > topLevel) { entry = node; topLevel = level }
  }

  /** Top-`k` approximate nearest neighbors of `q`, sorted by ascending
    * distance (ties by external id). `ef` defaults to
    * `max(params.efSearch, k)`.
    */
  def search(q: Array[Float], k: Int, ef: Int = -1): Array[Neighbor] = {
    if (size == 0) return Array.empty
    require(q.length == dim, s"query dim ${q.length} != index dim $dim")
    val beam = math.max(if (ef > 0) ef else params.efSearch, k)
    var ep = entry
    var l  = topLevel
    while (l > 0) { ep = greedyClosest(q, ep, l); l -= 1 }
    val cands = searchLayer(q, ep, beam, 0)
    cands
      .map { case (n, d) => Neighbor(ids(n), d) }
      .sortBy(n => (n.dist, n.id))
      .take(k)
      .toArray
  }

  /** Serialize to a binary stream (index + vectors + metadata), the unit the
    * LANNS indexer persists per (shard, segment).
    */
  def writeTo(out: DataOutputStream): Unit = {
    out.writeInt(HnswIndex.Magic)
    out.writeInt(dim)
    out.writeUTF(distance.name)
    out.writeInt(params.m); out.writeInt(params.efConstruction)
    out.writeInt(params.efSearch); out.writeLong(params.seed)
    out.writeInt(size); out.writeInt(entry); out.writeInt(topLevel)
    var i = 0
    while (i < size) {
      out.writeLong(ids(i))
      out.writeInt(levels(i))
      val v = vecs(i)
      var j = 0
      while (j < dim) { out.writeFloat(v(j)); j += 1 }
      val ls = links(i)
      var l = 0
      while (l < ls.length) {
        val nbrs = ls(l)
        out.writeInt(nbrs.length)
        var t = 0
        while (t < nbrs.length) { out.writeInt(nbrs(t)); t += 1 }
        l += 1
      }
      i += 1
    }
  }

  /** Serialize to a byte array (convenience over [[writeTo]]). */
  def toBytes: Array[Byte] = {
    val bos = new ByteArrayOutputStream()
    val dos = new DataOutputStream(bos)
    writeTo(dos); dos.flush()
    bos.toByteArray
  }
}

object HnswIndex {
  private val Magic = 0x4C414E53 // "LANS"

  /** Create an empty index. */
  def empty(dim: Int, distance: Distance, params: HnswParams): HnswIndex =
    new HnswIndex(dim, distance, params)

  /** Build an index from an iterator of (id, vector) pairs. */
  def build(dim: Int, distance: Distance, params: HnswParams,
            items: Iterator[(Long, Array[Float])]): HnswIndex = {
    val idx = empty(dim, distance, params)
    items.foreach { case (id, v) => idx.add(id, v) }
    idx
  }

  /** Deserialize an index previously written with [[HnswIndex.writeTo]]. */
  def readFrom(in: DataInputStream): HnswIndex = {
    val magic = in.readInt()
    require(magic == Magic, f"bad index file magic 0x$magic%08x")
    val dim  = in.readInt()
    val dist = Distance.of(in.readUTF())
    val params = HnswParams(in.readInt(), in.readInt(), in.readInt(), in.readLong())
    val n = in.readInt(); val entry = in.readInt(); val top = in.readInt()
    val idx = new HnswIndex(dim, dist, params)
    idx.entry = entry; idx.topLevel = top
    var i = 0
    while (i < n) {
      val id    = in.readLong()
      val level = in.readInt()
      val v     = new Array[Float](dim)
      var j = 0
      while (j < dim) { v(j) = in.readFloat(); j += 1 }
      val ls = Array.fill(level + 1)(new ArrayBuffer[Int])
      var l = 0
      while (l <= level) {
        val cnt = in.readInt()
        var t = 0
        while (t < cnt) { ls(l) += in.readInt(); t += 1 }
        l += 1
      }
      idx.ids += id; idx.vecs += v; idx.levels += level; idx.links += ls
      i += 1
    }
    idx
  }

  /** Deserialize from a byte array. */
  def fromBytes(bytes: Array[Byte]): HnswIndex =
    readFrom(new DataInputStream(new ByteArrayInputStream(bytes)))
}
