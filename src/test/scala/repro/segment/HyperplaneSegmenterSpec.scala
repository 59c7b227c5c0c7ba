package repro.segment

import org.scalatest.funsuite.AnyFunSuite

class HyperplaneSegmenterSpec extends AnyFunSuite {

  /** Depth-1 tree splitting on x at 0, spill boundaries [-0.5, 0.5]. */
  private def depth1: HyperplaneSegmenter =
    new HyperplaneSegmenter(
      Array(HyperplaneNode(Array(1f, 0f), split = 0.0, lo = -0.5, hi = 0.5)), depth = 1)

  /** Depth-2 tree: root splits on x at 0 (spill ±0.5); level-2 nodes split
    * on y at 0 (spill ±0.5).
    */
  private def depth2: HyperplaneSegmenter =
    new HyperplaneSegmenter(
      Array(
        HyperplaneNode(Array(1f, 0f), 0.0, -0.5, 0.5),
        HyperplaneNode(Array(0f, 1f), 0.0, -0.5, 0.5),
        HyperplaneNode(Array(0f, 1f), 0.0, -0.5, 0.5),
      ), depth = 2)

  test("numSegments is 2^depth") {
    assert(depth1.numSegments === 2)
    assert(depth2.numSegments === 4)
  }

  test("node-count validation") {
    intercept[IllegalArgumentException](
      new HyperplaneSegmenter(Array(HyperplaneNode(Array(1f), 0, 0, 0)), depth = 2))
  }

  test("data routing under virtual spill takes exactly one side of the median") {
    val s = depth1
    assert(s.routeData(1L, Array(-2f, 0f)).toSeq === Seq(0))
    assert(s.routeData(2L, Array(2f, 0f)).toSeq === Seq(1))
    // even inside the spill band, data goes to the median side
    assert(s.routeData(3L, Array(-0.2f, 0f)).toSeq === Seq(0))
    assert(s.routeData(4L, Array(0.2f, 0f)).toSeq === Seq(1))
  }

  test("query far from boundary routes to one segment") {
    val s = depth1
    assert(s.routeQuery(Array(-2f, 0f)).toSeq === Seq(0))
    assert(s.routeQuery(Array(2f, 0f)).toSeq === Seq(1))
  }

  test("query inside the spill band routes to both segments (virtual spill)") {
    assert(depth1.routeQuery(Array(0.2f, 0f)).sorted.toSeq === Seq(0, 1))
    assert(depth1.routeQuery(Array(-0.49f, 0f)).sorted.toSeq === Seq(0, 1))
  }

  test("projection exactly on a spill boundary still spills (closed interval)") {
    assert(depth1.routeQuery(Array(0.5f, 0f)).sorted.toSeq === Seq(0, 1))
    assert(depth1.routeQuery(Array(-0.5f, 0f)).sorted.toSeq === Seq(0, 1))
  }

  test("projection just outside the boundary does not spill") {
    assert(depth1.routeQuery(Array(0.51f, 0f)).toSeq === Seq(1))
  }

  test("depth-2 routing composes level decisions") {
    val s = depth2
    assert(s.routeData(1L, Array(-2f, -2f)).toSeq === Seq(0)) // left, down
    assert(s.routeData(2L, Array(-2f, 2f)).toSeq === Seq(1))  // left, up
    assert(s.routeData(3L, Array(2f, -2f)).toSeq === Seq(2))  // right, down
    assert(s.routeData(4L, Array(2f, 2f)).toSeq === Seq(3))   // right, up
  }

  test("depth-2 query in both spill bands reaches all four segments") {
    assert(depth2.routeQuery(Array(0f, 0f)).sorted.toSeq === Seq(0, 1, 2, 3))
  }

  test("depth-2 query in one spill band reaches exactly two segments") {
    assert(depth2.routeQuery(Array(0.1f, 2f)).sorted.toSeq === Seq(1, 3))
  }

  test("physical spill flips the duplication side: data spills, query does not") {
    val s = depth1.withPhysicalSpill(true)
    assert(s.routeData(1L, Array(0.2f, 0f)).sorted.toSeq === Seq(0, 1))
    assert(s.routeData(2L, Array(2f, 0f)).toSeq === Seq(1))
    assert(s.routeQuery(Array(0.2f, 0f)).toSeq === Seq(1))
    assert(s.routeQuery(Array(-0.2f, 0f)).toSeq === Seq(0))
  }

  test("withPhysicalSpill keeps the tree and depth") {
    val s = depth2.withPhysicalSpill(true)
    assert(s.numSegments === 4)
    assert(s.withPhysicalSpill(false).routeQuery(Array(0f, 0f)).length === 4)
  }

  test("routeData and routeQuery always return non-empty segment sets") {
    val rng = new java.util.Random(3)
    val s = depth2
    (0 until 200).foreach { i =>
      val v = Array(rng.nextFloat() * 4 - 2, rng.nextFloat() * 4 - 2)
      assert(s.routeData(i.toLong, v).nonEmpty)
      assert(s.routeQuery(v).nonEmpty)
    }
  }

  test("segment ids are always within [0, numSegments)") {
    val rng = new java.util.Random(4)
    val s = depth2
    (0 until 200).foreach { i =>
      val v = Array(rng.nextFloat() * 4 - 2, rng.nextFloat() * 4 - 2)
      (s.routeData(i.toLong, v) ++ s.routeQuery(v)).foreach { g =>
        assert(g >= 0 && g < s.numSegments)
      }
    }
  }

  test("is Serializable for broadcast") {
    val out = new java.io.ObjectOutputStream(new java.io.ByteArrayOutputStream())
    out.writeObject(depth2)
  }
}
