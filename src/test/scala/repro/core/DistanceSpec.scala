package repro.core

import org.scalatest.funsuite.AnyFunSuite

class DistanceSpec extends AnyFunSuite {

  test("Euclidean delegates to squared L2") {
    val a = Array(0f, 0f); val b = Array(3f, 4f)
    assert(Distance.Euclidean(a, b) === 25.0)
  }

  test("Cosine delegates to cosine distance") {
    assert(math.abs(Distance.Cosine(Array(1f, 0f), Array(0f, 1f)) - 1.0) < 1e-9)
  }

  test("names are stable") {
    assert(Distance.Euclidean.name === "l2")
    assert(Distance.Cosine.name === "cosine")
  }

  test("of() resolves both distances by name") {
    assert(Distance.of("l2") === Distance.Euclidean)
    assert(Distance.of("cosine") === Distance.Cosine)
  }

  test("of() rejects unknown names") {
    intercept[IllegalArgumentException](Distance.of("manhattan"))
  }

  test("distances are Serializable (for Spark closures)") {
    val out = new java.io.ObjectOutputStream(new java.io.ByteArrayOutputStream())
    out.writeObject(Distance.Euclidean)
    out.writeObject(Distance.Cosine)
  }
}
