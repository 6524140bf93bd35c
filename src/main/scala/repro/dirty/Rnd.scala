package repro.dirty

/** Deterministic pseudo-randomness for data generation: every generated cell
  * is a pure function of (seed, entity id, salt), so the same configuration
  * always produces byte-identical databases on the driver and on executors.
  */
object Rnd extends Serializable {

  /** splitmix64 finalizer. */
  def mix(z0: Long): Long = {
    var z = z0 + 0x9e3779b97f4a7c15L
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }

  def hash(xs: Long*): Long = xs.foldLeft(0x51_7c_c1_b7_27_22_0a_95L)((a, x) => mix(a ^ mix(x)))

  /** Uniform double in [0, 1). */
  def double(xs: Long*): Double = (hash(xs: _*) >>> 11).toDouble / (1L << 53).toDouble

  /** Uniform int in [0, n). */
  def int(n: Int, xs: Long*): Int = {
    require(n > 0)
    (Math.floorMod(hash(xs: _*), n.toLong)).toInt
  }

  def pick[A](pool: IndexedSeq[A], xs: Long*): A = pool(int(pool.length, xs: _*))
}

/** Synthetic vocabulary: pronounceable words built from syllables, plus
  * person-name pools. Small pools on purpose — near-duplicate names are what
  * make similarity matching (and its failure modes) non-trivial.
  */
object Words extends Serializable {
  private val consonants = Vector("b", "d", "f", "g", "k", "l", "m", "n", "p", "r", "s", "t", "v", "z")
  private val vowels     = Vector("a", "e", "i", "o", "u")

  /** Deterministic word #i: 2–3 syllables. */
  def word(i: Int): String = {
    val n  = 2 + Rnd.int(2, i.toLong, 11L)
    val sb = new StringBuilder
    var k = 0
    while (k < n) {
      sb.append(consonants(Rnd.int(consonants.length, i.toLong, 13L + k)))
      sb.append(vowels(Rnd.int(vowels.length, i.toLong, 17L + k)))
      k += 1
    }
    sb.toString
  }

  val poolSize = 240
  /** Word #k of the shared title vocabulary. */
  def titleWord(k: Long, seed: Long): String = word(Rnd.int(poolSize, k, seed, 19L))

  private val romans = Vector("ii", "iii", "iv", "v")
  /** Variant suffix for the j-th member of a family (the paper's
    * "Episode IV" / "Episode III" near-duplicates).
    */
  def variant(j: Int): String = "part " + romans(j % romans.length)

  val firstNames: Vector[String] = Vector.tabulate(40)(i => word(1000 + i))
  val lastNames: Vector[String]  = Vector.tabulate(60)(i => word(2000 + i))

  /** Person name #i from a pool of `n`: "first last". */
  def person(i: Int, seed: Long): String =
    firstNames(Rnd.int(firstNames.length, i.toLong, seed, 23L)) + " " +
      lastNames(Rnd.int(lastNames.length, i.toLong, seed, 29L))

  /** Abbreviate the first word to an initial: "jose smith" → "j. smith". */
  def abbrevFirst(name: String): String = {
    val parts = name.split(" ")
    if (parts.length < 2 || parts(0).isEmpty) name
    else parts(0).take(1) + ". " + parts.drop(1).mkString(" ")
  }

  /** Introduce a single-character typo (drop one character) deterministically. */
  def typo(s: String, seed: Long): String =
    if (s.length < 4) s
    else {
      val i = 1 + Rnd.int(s.length - 2, seed, s.length.toLong, 31L)
      s.substring(0, i) + s.substring(i + 1)
    }
}
