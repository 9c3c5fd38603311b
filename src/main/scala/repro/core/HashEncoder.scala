package repro.core

/** 64-bit hash encoding of tokens (paper §4.1.4).
  *
  * A deterministic hash maps each token to a 64-bit integer, replacing the
  * token→id dictionary that ordinal encoding would need (which the paper shows
  * grows to hundreds of MB on large corpora, Fig. 10). Because the same
  * function runs at training and matching time, no mapping is ever stored, and
  * tokens hash independently — i.e. the encoding parallelizes per token.
  *
  * We use FNV-1a 64: stable across JVMs (unlike `String.hashCode`'s 32 bits),
  * allocation-free, and fast. Collision probability follows the birthday bound
  * of Eq. 1 — ~2.7e-6 at 10M distinct tokens — and is treated as negligible,
  * exactly as the paper argues.
  */
object HashEncoder {
  private val FnvOffset = 0xcbf29ce484222325L
  private val FnvPrime  = 0x100000001b3L

  /** FNV-1a 64-bit hash of a token. */
  def hash64(token: String): Long = {
    var h = FnvOffset
    var i = 0
    val n = token.length
    while (i < n) {
      val c = token.charAt(i)
      // hash both bytes of the UTF-16 char so non-ASCII logs encode stably
      h = (h ^ (c & 0xff)) * FnvPrime
      h = (h ^ ((c >> 8) & 0xff)) * FnvPrime
      i += 1
    }
    h
  }

  /** Encode a tokenized log as its 64-bit vector. */
  def encode(tokens: Array[String]): Array[Long] = {
    val out = new Array[Long](tokens.length)
    var i = 0
    while (i < tokens.length) { out(i) = hash64(tokens(i)); i += 1 }
    out
  }

  /** Collision probability after hashing `n` distinct tokens (Eq. 1),
    * `1 - exp(-n(n-1)/2^65)` — exposed so tests can pin the paper's example
    * (10M tokens → 2.71e-6).
    */
  def collisionProbability(n: Long): Double =
    1.0 - math.exp(-(n.toDouble * (n - 1).toDouble) / (2.0 * math.pow(2.0, 64)))
}
