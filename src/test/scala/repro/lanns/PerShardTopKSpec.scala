package repro.lanns

import org.scalacheck.{Gen, Prop, Test => SCTest}
import org.scalatest.funsuite.AnyFunSuite

class PerShardTopKSpec extends AnyFunSuite {

  test("probit of 0.5 is 0") {
    assert(math.abs(PerShardTopK.probit(0.5)) < 1e-9)
  }

  test("probit matches standard normal quantiles") {
    assert(math.abs(PerShardTopK.probit(0.975) - 1.959964) < 1e-4)
    assert(math.abs(PerShardTopK.probit(0.95) - 1.644854) < 1e-4)
    assert(math.abs(PerShardTopK.probit(0.025) + 1.959964) < 1e-4)
    assert(math.abs(PerShardTopK.probit(0.999) - 3.090232) < 1e-3)
  }

  test("probit is antisymmetric around 0.5") {
    Seq(0.01, 0.1, 0.3, 0.45).foreach { p =>
      assert(math.abs(PerShardTopK.probit(p) + PerShardTopK.probit(1 - p)) < 1e-6)
    }
  }

  test("probit rejects values outside (0,1)") {
    intercept[IllegalArgumentException](PerShardTopK.probit(0.0))
    intercept[IllegalArgumentException](PerShardTopK.probit(1.0))
  }

  test("single shard keeps the full topK") {
    assert(PerShardTopK(100, 1, 0.95) === 100)
  }

  test("paper example: topK=100, 20 shards, confidence 0.95 shrinks far below 100") {
    val k = PerShardTopK(100, 20, 0.95)
    // s' = 0.05, z = 1.96 -> cI ~ 0.0927 -> ceil(9.27) = 10
    assert(k === 10)
  }

  test("two shards with confidence 0.95 keeps ~60% of topK") {
    val k = PerShardTopK(100, 2, 0.95)
    // s' = 0.5, z = 1.96, sqrt(0.25/100) = 0.05 -> cI = 0.598 -> 60
    assert(k === 60)
  }

  test("never exceeds topK and never drops below 1") {
    for (topK <- Seq(1, 5, 100, 1000); s <- Seq(1, 2, 8, 64); p <- Seq(0.5, 0.95, 0.99)) {
      val k = PerShardTopK(topK, s, p)
      assert(k >= 1 && k <= topK, s"topK=$topK shards=$s p=$p -> $k")
    }
  }

  test("more shards means fewer results fetched per shard") {
    val ks = Seq(2, 4, 8, 16, 32).map(PerShardTopK(200, _, 0.95))
    assert(ks === ks.sorted.reverse, s"not monotone: $ks")
  }

  test("higher confidence widens the per-shard cutoff") {
    val low = PerShardTopK(1000, 10, 0.5)
    val high = PerShardTopK(1000, 10, 0.999)
    assert(high > low)
  }

  test("larger topK tightens the relative interval") {
    // cI -> s' as topK grows, so perShardTopK/topK decreases toward 1/S
    val small = PerShardTopK(10, 4, 0.95) / 10.0
    val big = PerShardTopK(10000, 4, 0.95) / 10000.0
    assert(big < small)
    assert(big >= 0.25) // never below s' = 1/4
  }

  test("input validation") {
    intercept[IllegalArgumentException](PerShardTopK(0, 4, 0.95))
    intercept[IllegalArgumentException](PerShardTopK(10, 4, 1.0))
  }

  test("property: result always in [1, topK] over random inputs") {
    val p = Prop.forAll(Gen.chooseNum(1, 5000), Gen.chooseNum(1, 100),
      Gen.chooseNum(0.01, 0.99)) { (topK, shards, conf) =>
      val k = PerShardTopK(topK, shards, conf)
      k >= 1 && k <= topK
    }
    val r = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(300), p)
    assert(r.passed, r.status.toString)
  }
}
