package repro.core

/** Q-gram tokenization of QID strings.
  *
  * PPRL encodes each QID as its set of character q-grams (sub-strings of
  * length q); Bloom filters and MinHash signatures are then built over that
  * set. Padding with `q-1` sentinel characters on both ends weights the
  * first/last characters, the standard choice in the Schnell line of work.
  */
object QGrams {

  val PadChar: Char = '#'

  /** Lower-case, trim, and collapse runs of whitespace — QIDs from
    * different sources must normalize identically before tokenizing.
    */
  def normalize(s: String): String =
    if (s == null) "" else s.trim.toLowerCase.replaceAll("\\s+", " ")

  /** Ordered list of q-grams of `s` (normalized), padded iff `pad`.
    * Empty input yields no grams.
    */
  def qgramList(s: String, q: Int = 2, pad: Boolean = true): Seq[String] = {
    require(q >= 1, s"q must be >= 1, got $q")
    val n = normalize(s)
    if (n.isEmpty) Seq.empty
    else {
      val padded = if (pad && q > 1) {
        val p = PadChar.toString * (q - 1)
        p + n + p
      } else n
      if (padded.length < q) Seq.empty
      else (0 to padded.length - q).map(i => padded.substring(i, i + q))
    }
  }

  /** Distinct q-grams of `s` — the token *set* that gets encoded. */
  def qgrams(s: String, q: Int = 2, pad: Boolean = true): Set[String] =
    qgramList(s, q, pad).toSet

  /** Union of per-field q-gram sets. With `tagged`, grams are prefixed by
    * the field index so identical grams in different fields stay distinct
    * (a CLK variant; classic CLK uses the untagged union).
    */
  def recordGrams(fields: Seq[String], q: Int = 2, pad: Boolean = true,
                  tagged: Boolean = false): Set[String] =
    fields.zipWithIndex.flatMap { case (f, i) =>
      val gs = qgrams(f, q, pad)
      if (tagged) gs.map(g => s"$i:$g") else gs
    }.toSet

  /** Plaintext Jaccard over q-gram sets — the unencoded upper bound that
    * encoded similarities are compared against.
    */
  def jaccard(a: Set[String], b: Set[String]): Double =
    if (a.isEmpty && b.isEmpty) 0.0
    else a.intersect(b).size.toDouble / a.union(b).size.toDouble

  /** Plaintext Dice over q-gram sets. */
  def dice(a: Set[String], b: Set[String]): Double =
    if (a.isEmpty && b.isEmpty) 0.0
    else 2.0 * a.intersect(b).size.toDouble / (a.size + b.size).toDouble
}
