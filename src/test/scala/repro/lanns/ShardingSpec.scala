package repro.lanns

import org.scalatest.funsuite.AnyFunSuite

class ShardingSpec extends AnyFunSuite {

  test("shard ids are within [0, numShards)") {
    (0L until 1000L).foreach { id =>
      val s = Sharding.shardOf(id, 7)
      assert(s >= 0 && s < 7)
    }
  }

  test("sharding is deterministic") {
    (0L until 100L).foreach(id => assert(Sharding.shardOf(id, 8) === Sharding.shardOf(id, 8)))
  }

  test("one shard maps everything to shard 0") {
    (0L until 100L).foreach(id => assert(Sharding.shardOf(id, 1) === 0))
  }

  test("negative and extreme ids are handled") {
    Seq(-1L, Long.MinValue, Long.MaxValue).foreach { id =>
      val s = Sharding.shardOf(id, 5)
      assert(s >= 0 && s < 5)
    }
  }

  test("distribution over shards is roughly uniform for sequential keys") {
    val counts = (0L until 10000L).map(Sharding.shardOf(_, 4))
      .groupBy(identity).view.mapValues(_.size).toMap
    assert(counts.keySet === Set(0, 1, 2, 3))
    counts.values.foreach(c => assert(math.abs(c - 2500) < 350, s"skew: $counts"))
  }

  test("rejects non-positive shard counts") {
    intercept[IllegalArgumentException](Sharding.shardOf(1L, 0))
  }
}
