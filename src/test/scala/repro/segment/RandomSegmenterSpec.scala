package repro.segment

import org.scalatest.funsuite.AnyFunSuite

class RandomSegmenterSpec extends AnyFunSuite {

  test("routes every data point to exactly one segment") {
    val s = new RandomSegmenter(8)
    (0L until 100L).foreach { id =>
      val r = s.routeData(id, Array(0f))
      assert(r.length === 1)
      assert(r.head >= 0 && r.head < 8)
    }
  }

  test("routing is deterministic in the id") {
    val s = new RandomSegmenter(8)
    (0L until 50L).foreach { id =>
      assert(s.routeData(id, Array(0f)).toSeq === s.routeData(id, Array(9f)).toSeq)
    }
  }

  test("queries fan out to all segments") {
    val s = new RandomSegmenter(5)
    assert(s.routeQuery(Array(1f, 2f)).toSeq === (0 until 5))
  }

  test("single-segment segmenter sends everything to segment 0") {
    val s = new RandomSegmenter(1)
    assert(s.routeData(123L, Array(0f)).toSeq === Seq(0))
    assert(s.routeQuery(Array(0f)).toSeq === Seq(0))
  }

  test("assignment is roughly uniform over segments") {
    val s = new RandomSegmenter(4)
    val counts = (0L until 8000L).map(id => s.routeData(id, Array(0f)).head)
      .groupBy(identity).view.mapValues(_.size).toMap
    assert(counts.keySet === Set(0, 1, 2, 3))
    counts.values.foreach(c => assert(math.abs(c - 2000) < 300, s"skewed counts: $counts"))
  }

  test("different seeds give different assignments") {
    val a = new RandomSegmenter(8, seed = 1L)
    val b = new RandomSegmenter(8, seed = 2L)
    val same = (0L until 200L).count(id =>
      a.routeData(id, Array(0f)).head == b.routeData(id, Array(0f)).head)
    assert(same < 80) // expected ~25 of 200 under independence
  }

  test("rejects a non-positive segment count") {
    intercept[IllegalArgumentException](new RandomSegmenter(0))
  }

  test("is Serializable for broadcast") {
    val out = new java.io.ObjectOutputStream(new java.io.ByteArrayOutputStream())
    out.writeObject(new RandomSegmenter(8))
  }
}
