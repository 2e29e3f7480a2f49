package repro.data

import repro.core.Hashing

/** GeCo-style deterministic record corruptor.
  *
  * Real linkage inputs contain typos, OCR slips, swapped fields, and
  * missing values; the corruptor injects those with edits chosen purely by
  * `(seed)` so the corrupted databases are reproducible across runs and
  * across the DuckDB oracle.
  *
  * All randomness flows through [[repro.core.Hashing.mix]] on an evolving
  * seed — no `java.util.Random`, so a corruption is a pure function of its
  * arguments.
  */
object Corruptor {

  private val Alphabet = "abcdefghijklmnopqrstuvwxyz"

  private def nextSeed(s: Long): Long = Hashing.splitmix64(s)
  private def pickInt(s: Long, n: Int): Int = Hashing.hashInt(s, 0x5eedL, n)

  /** One random character edit: substitution, deletion, insertion, or
    * adjacent transposition, uniformly chosen.
    */
  def edit1(s: String, seed: Long): String = {
    if (s == null || s.isEmpty) return s
    val op = pickInt(seed, 4)
    val posSeed = nextSeed(seed)
    val chSeed = nextSeed(posSeed)
    op match {
      case 0 => // substitute
        val i = pickInt(posSeed, s.length)
        val c = Alphabet(pickInt(chSeed, 26))
        s.substring(0, i) + c + s.substring(i + 1)
      case 1 => // delete
        if (s.length == 1) s
        else { val i = pickInt(posSeed, s.length); s.substring(0, i) + s.substring(i + 1) }
      case 2 => // insert
        val i = pickInt(posSeed, s.length + 1)
        val c = Alphabet(pickInt(chSeed, 26))
        s.substring(0, i) + c + s.substring(i)
      case _ => // transpose adjacent
        if (s.length == 1) s
        else {
          val i = pickInt(posSeed, s.length - 1)
          s.substring(0, i) + s(i + 1) + s(i) + s.substring(i + 2)
        }
    }
  }

  /** Apply `n` independent character edits. */
  def edits(s: String, n: Int, seed: Long): String = {
    var out = s; var sd = seed; var i = 0
    while (i < n) { out = edit1(out, sd); sd = nextSeed(sd ^ 0x0badf00dL); i += 1 }
    out
  }

  /** A corrupted view of a person record's string QIDs.
    *
    * With probability `rate` (decided by `hash01(entId, salt)`) the record
    * is corrupted: 1..maxEdits edits are spread over first name, last name
    * and city; with small fixed probabilities the first/last names are
    * swapped or the DOB day/month transposed — classic GeCo corruptions.
    */
  def corruptRecord(fname: String, lname: String, dob: String, city: String,
                    entId: Long, salt: Long, rate: Double, maxEdits: Int)
      : (String, String, String, String) = {
    if (Hashing.hash01(entId, salt ^ 0xc0ffeeL) >= rate) (fname, lname, dob, city)
    else {
      var f = fname; var l = lname; var d = dob; var c = city
      val base = Hashing.mix(entId, salt)
      // swap first/last names 10% of corrupted records
      if (Hashing.hash01(entId, salt ^ 0x51a9L) < 0.10) { val t = f; f = l; l = t }
      // transpose dob month/day 10% of corrupted records (dob = yyyymmdd)
      if (Hashing.hash01(entId, salt ^ 0xd0bL) < 0.10 && d.length == 8)
        d = d.substring(0, 4) + d.substring(6, 8) + d.substring(4, 6)
      // missing city value for 5% of corrupted records
      if (Hashing.hash01(entId, salt ^ 0x9155L) < 0.05) c = ""
      val total = 1 + pickInt(base, maxEdits)
      var i = 0
      while (i < total) {
        val sd = Hashing.mix(base, i + 17L)
        pickInt(sd, 3) match {
          case 0 => f = edit1(f, sd)
          case 1 => l = edit1(l, sd)
          case _ => c = edit1(c, sd)
        }
        i += 1
      }
      (f, l, d, c)
    }
  }
}
