package repro.core

import org.scalatest.funsuite.AnyFunSuite

class HashEncoderSpec extends AnyFunSuite {

  test("hash is deterministic") {
    assert(HashEncoder.hash64("hello") == HashEncoder.hash64("hello"))
  }

  test("different tokens hash differently (sample)") {
    val tokens = (0 until 100000).map(i => s"tok$i")
    assert(tokens.map(HashEncoder.hash64).distinct.size == tokens.size)
  }

  test("hash differs from String.hashCode (64-bit, stable encoding)") {
    assert(HashEncoder.hash64("abc") != "abc".hashCode.toLong)
  }

  test("empty token has the FNV offset basis") {
    assert(HashEncoder.hash64("") == 0xcbf29ce484222325L)
  }

  test("non-ASCII tokens hash stably and distinctly") {
    assert(HashEncoder.hash64("日志") == HashEncoder.hash64("日志"))
    assert(HashEncoder.hash64("日志") != HashEncoder.hash64("志日"))
  }

  test("encode maps each token positionally") {
    val toks = Array("a", "b", "a")
    val enc = HashEncoder.encode(toks)
    assert(enc.length == 3)
    assert(enc(0) == enc(2))
    assert(enc(0) != enc(1))
  }

  test("encode of empty array is empty") {
    assert(HashEncoder.encode(Array.empty[String]).isEmpty)
  }

  test("collision probability matches the paper's example (10M tokens → ~2.7e-6)") {
    val p = HashEncoder.collisionProbability(10_000_000L)
    // paper: "with 10 million distinct tokens, the collision probability is
    // only 0.000271%"
    assert(math.abs(p - 2.71e-6) < 2e-8, s"p=$p")
  }

  test("collision probability is monotone in n") {
    val ps = Seq(1_000L, 1_000_000L, 100_000_000L).map(HashEncoder.collisionProbability)
    assert(ps == ps.sorted)
  }

  test("collision probability at n=1 is zero") {
    assert(HashEncoder.collisionProbability(1L) == 0.0)
  }
}
