package repro.core

import java.nio.charset.StandardCharsets
import javax.crypto.Mac
import javax.crypto.spec.SecretKeySpec
import scala.util.hashing.MurmurHash3

/** Deterministic hashing primitives shared by the data generator, the
  * Bloom-filter encoders, and the hashed-key blocking joins.
  *
  * Two families:
  *  - '''splitmix64''' — a statistically strong 64-bit mixer used to derive
  *    entity attributes and corruption decisions deterministically from
  *    `(id, salt)`, so every party regenerates identical ground truth.
  *  - '''keyed token hashing''' — MurmurHash3 seeded by a shared secret for
  *    the per-token inner loop of Bloom-filter encoding (cheap, called
  *    k×|tokens| times per record), and HMAC-SHA256 for record-level
  *    exchange keys (exact-match linkage, blocking keys) where the O(1)
  *    per-record cost of real crypto is affordable.
  */
object Hashing {

  /** splitmix64 finalizer: a bijective 64-bit mix with good avalanche. */
  def splitmix64(x0: Long): Long = {
    var x = x0 + 0x9e3779b97f4a7c15L
    x = (x ^ (x >>> 30)) * 0xbf58476d1ce4e5b9L
    x = (x ^ (x >>> 27)) * 0x94d049bb133111ebL
    x ^ (x >>> 31)
  }

  /** Mix two longs into one (for `(id, salt)` style derivations). */
  def mix(a: Long, b: Long): Long = splitmix64(splitmix64(a) ^ b)

  /** Deterministic uniform double in [0, 1) from `(x, salt)`. */
  def hash01(x: Long, salt: Long): Double =
    ((mix(x, salt) >>> 11).toDouble) / (1L << 53).toDouble

  /** Deterministic uniform int in [0, n) from `(x, salt)`. */
  def hashInt(x: Long, salt: Long, n: Int): Int = {
    require(n > 0, s"hashInt needs n > 0, got $n")
    (math.floorMod(mix(x, salt), n.toLong)).toInt
  }

  /** Keyed 32-bit token hash: MurmurHash3 of the token under a seed derived
    * from `(secret, seedIndex)`. Used for BF double hashing and MinHash.
    */
  def tokenHash(token: String, secret: String, seedIndex: Int): Int =
    MurmurHash3.stringHash(token, MurmurHash3.stringHash(secret, seedIndex))

  /** Keyed non-negative token hash into [0, m). */
  def tokenHashMod(token: String, secret: String, seedIndex: Int, m: Int): Int =
    math.floorMod(tokenHash(token, secret, seedIndex), m)

  /** HMAC-SHA256 of `value` under `secret`, hex-encoded. One call per
    * record — this is the "encrypted key" exchanged in exact-match linkage
    * and in hashed blocking keys.
    */
  def hmacSha256Hex(value: String, secret: String): String = {
    val mac = Mac.getInstance("HmacSHA256")
    mac.init(new SecretKeySpec(secret.getBytes(StandardCharsets.UTF_8), "HmacSHA256"))
    mac.doFinal(value.getBytes(StandardCharsets.UTF_8))
      .map(b => f"$b%02x").mkString
  }
}
