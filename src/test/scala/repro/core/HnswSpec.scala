package repro.core

import org.scalatest.funsuite.AnyFunSuite

class HnswSpec extends AnyFunSuite {

  private val params = HnswParams(m = 8, efConstruction = 60, efSearch = 50, seed = 1L)

  /** Deterministic clustered points: `n` points around `nClusters` centers. */
  private def clustered(n: Int, dim: Int, nClusters: Int, seed: Long): IndexedSeq[(Long, Array[Float])] = {
    val rng = new java.util.Random(seed)
    val centers = Array.fill(nClusters)(Array.fill(dim)(rng.nextFloat() * 2 - 1))
    (0 until n).map { i =>
      val c = centers(rng.nextInt(nClusters))
      i.toLong -> Array.tabulate(dim)(j => c(j) + (rng.nextGaussian() * 0.1).toFloat)
    }
  }

  private def build(items: Iterable[(Long, Array[Float])], dim: Int,
                    p: HnswParams = params): HnswIndex =
    HnswIndex.build(dim, Distance.Euclidean, p, items.iterator)

  test("empty index returns no neighbors") {
    val idx = HnswIndex.empty(4, Distance.Euclidean, params)
    assert(idx.search(Array(0f, 0f, 0f, 0f), 5).isEmpty)
    assert(idx.size === 0)
    assert(idx.maxLevel === -1)
  }

  test("single-point index returns that point") {
    val idx = HnswIndex.empty(2, Distance.Euclidean, params)
    idx.add(42L, Array(1f, 2f))
    val r = idx.search(Array(1f, 2f), 3)
    assert(r.map(_.id).toSeq === Seq(42L))
    assert(r.head.dist === 0.0)
  }

  test("add rejects wrong dimension") {
    val idx = HnswIndex.empty(3, Distance.Euclidean, params)
    intercept[IllegalArgumentException](idx.add(1L, Array(1f, 2f)))
  }

  test("search rejects wrong query dimension") {
    val idx = HnswIndex.empty(3, Distance.Euclidean, params)
    idx.add(1L, Array(1f, 2f, 3f))
    intercept[IllegalArgumentException](idx.search(Array(1f), 1))
  }

  test("k larger than size returns all points") {
    val idx = build(clustered(5, 4, 2, 3L), 4)
    assert(idx.search(Array(0f, 0f, 0f, 0f), 50).length === 5)
  }

  test("results are sorted by ascending distance") {
    val idx = build(clustered(300, 8, 5, 4L), 8)
    val r = idx.search(Array.fill(8)(0f), 20)
    assert(r.map(_.dist).toSeq === r.map(_.dist).sorted.toSeq)
  }

  test("results contain no duplicate ids") {
    val idx = build(clustered(300, 8, 5, 5L), 8)
    val r = idx.search(Array.fill(8)(0.1f), 30)
    assert(r.map(_.id).distinct.length === r.length)
  }

  test("exact match is always found with a generous beam") {
    val data = clustered(500, 8, 10, 6L)
    val idx = build(data, 8)
    data.take(25).foreach { case (id, v) =>
      val r = idx.search(v, 1, ef = 200)
      assert(r.head.dist === 0.0, s"point $id not its own nearest neighbor")
    }
  }

  test("recall@10 >= 0.9 vs brute force on clustered data") {
    val data = clustered(2000, 16, 20, 7L)
    val idx = build(data, 16, HnswParams(m = 16, efConstruction = 100, efSearch = 100, seed = 2L))
    val rng = new java.util.Random(8L)
    val queries = (0 until 50).map(_ => Array.fill(16)((rng.nextGaussian() * 0.5).toFloat))
    val recalls = queries.map { q =>
      val approx = idx.search(q, 10, ef = 100).map(_.id).toSet
      val exact = BruteForce.topK(data, q, 10, Distance.Euclidean).map(_.id).toSet
      (approx & exact).size / 10.0
    }
    val mean = recalls.sum / recalls.length
    assert(mean >= 0.9, s"mean recall@10 was $mean")
  }

  test("higher ef does not reduce recall (monotone accuracy/speed knob)") {
    val data = clustered(1500, 8, 12, 9L)
    val idx = build(data, 8, HnswParams(m = 8, efConstruction = 80, efSearch = 20, seed = 3L))
    val rng = new java.util.Random(10L)
    val queries = (0 until 30).map(_ => Array.fill(8)((rng.nextGaussian() * 0.5).toFloat))
    def recall(ef: Int): Double = queries.map { q =>
      val approx = idx.search(q, 10, ef).map(_.id).toSet
      val exact = BruteForce.topK(data, q, 10, Distance.Euclidean).map(_.id).toSet
      (approx & exact).size / 10.0
    }.sum / queries.length
    assert(recall(200) >= recall(10) - 0.02)
  }

  test("build is deterministic for a fixed seed and insertion order") {
    val data = clustered(400, 8, 6, 11L)
    val a = build(data, 8)
    val b = build(data, 8)
    val q = Array.fill(8)(0.2f)
    assert(a.search(q, 15).toSeq === b.search(q, 15).toSeq)
  }

  test("adjacency degree never exceeds 2*m") {
    val idx = build(clustered(1000, 8, 8, 12L), 8)
    assert(idx.maxObservedDegree <= 2 * params.m)
  }

  test("level distribution decays roughly geometrically") {
    val idx = build(clustered(2000, 4, 5, 13L), 4)
    val l0 = idx.countAtLevel(0)
    val l1 = idx.countAtLevel(1)
    val l2 = idx.countAtLevel(2)
    assert(l0 === 2000)
    assert(l1 < l0 / 2) // expected fraction 1/m = 1/8
    assert(l2 <= l1)
    assert(idx.maxLevel < 12)
  }

  test("duplicate external ids are tolerated") {
    val idx = HnswIndex.empty(2, Distance.Euclidean, params)
    idx.add(1L, Array(0f, 0f))
    idx.add(1L, Array(1f, 1f))
    assert(idx.size === 2)
    val r = idx.search(Array(0f, 0f), 2)
    assert(r.length === 2)
  }

  test("ties in distance are broken by ascending id") {
    val idx = HnswIndex.empty(2, Distance.Euclidean, params)
    idx.add(9L, Array(1f, 0f))
    idx.add(3L, Array(-1f, 0f))
    idx.add(6L, Array(0f, 1f))
    val r = idx.search(Array(0f, 0f), 3, ef = 10)
    assert(r.map(_.id).toSeq === Seq(3L, 6L, 9L))
  }

  test("cosine-distance index ranks by angle not magnitude") {
    val idx = HnswIndex.empty(2, Distance.Cosine, params)
    idx.add(1L, Array(10f, 0f))   // same direction as query, large magnitude
    idx.add(2L, Array(0.1f, 0.9f)) // different direction, closer in L2
    val r = idx.search(Array(1f, 0f), 1, ef = 10)
    assert(r.head.id === 1L)
  }

  test("entry point tracks the highest level as the index grows") {
    val data = clustered(800, 4, 4, 14L)
    val idx = HnswIndex.empty(4, Distance.Euclidean, params)
    var maxSeen = -1
    data.foreach { case (id, v) =>
      idx.add(id, v)
      assert(idx.maxLevel >= maxSeen)
      maxSeen = idx.maxLevel
    }
  }

  test("search with default ef uses params.efSearch (still >= k)") {
    val data = clustered(500, 8, 6, 15L)
    val idx = build(data, 8, HnswParams(m = 8, efConstruction = 60, efSearch = 5, seed = 4L))
    // k=20 > efSearch=5: beam must be clamped up to k, so 20 results return
    assert(idx.search(Array.fill(8)(0f), 20).length === 20)
  }
}
