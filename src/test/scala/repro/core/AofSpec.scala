package repro.core

import org.scalatest.funsuite.AnyFunSuite

class AofSpec extends AnyFunSuite {
  test("identity returns its input") {
    for (p <- Seq(0.0, 0.3, 1.0)) assert(Aof.Identity(p) === p)
  }
  test("invert returns 1 - p") {
    assert(Aof.Invert(0.0) === 1.0)
    assert(Aof.Invert(1.0) === 0.0)
    assert(math.abs(Aof.Invert(0.3) - 0.7) < 1e-12)
  }
  test("invert is its own inverse") {
    for (p <- Seq(0.1, 0.5, 0.9)) assert(math.abs(Aof.Invert(Aof.Invert(p)) - p) < 1e-12)
  }
  test("zero always returns 0") {
    for (p <- Seq(0.0, 0.5, 1.0)) assert(Aof.Zero(p) === 0.0)
  }
  test("zeroIf zeroes matching inputs") {
    val aof = Aof.ZeroIf(_ > 0.5)
    assert(aof(0.7) === 0.0)
    assert(aof(0.3) === 0.3)
  }
  test("zeroIf composes with invert for non-matching inputs") {
    val aof = Aof.ZeroIf(_ < 0.1, otherwise = Aof.Invert)
    assert(aof(0.05) === 0.0)
    assert(math.abs(aof(0.4) - 0.6) < 1e-12)
  }
  test("aofs are serializable") {
    val bos = new java.io.ByteArrayOutputStream()
    new java.io.ObjectOutputStream(bos).writeObject(Aof.Invert)
    assert(bos.size() > 0)
  }
}
