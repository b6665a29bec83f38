package repro.text

/** Deterministic feature-hashed token embeddings — the stand-in for the
  * pretrained 300-d FastText vectors used by the paper (§5.1).
  *
  * Each token maps to a fixed D-dimensional vector whose entries are
  * pseudo-random in {-1,+1}/sqrt(D), derived from a 64-bit mix of the token
  * and the dimension index. Identical tokens therefore share identical
  * embeddings (the property the contrastive sim/uni features rely on) and
  * distinct tokens are near-orthogonal in expectation — the geometry that
  * summed-token-embedding matchers exploit. See DESIGN.md §2 for why this
  * substitution preserves the paper's mechanism.
  *
  * Missing values (challenges C1/C2) are embedded as a *fixed normalized
  * non-zero vector* exactly as §4.3 prescribes, so that the affine layers
  * still receive gradient for never-observed attributes.
  */
object HashEmbed extends Serializable {
  val DefaultDim = 32

  private def mix64(z0: Long): Long = {
    var z = z0 + 0x9E3779B97F4A7C15L
    z = (z ^ (z >>> 30)) * 0xBF58476D1CE4E5B9L
    z = (z ^ (z >>> 27)) * 0x94D049BB133111EBL
    z ^ (z >>> 31)
  }

  private def tokenHash(token: String): Long = {
    var h = 1125899906842597L
    var i = 0
    while (i < token.length) { h = 31 * h + token.charAt(i); i += 1 }
    h
  }

  /** Embedding of one token: entries in {-1,+1}/sqrt(D). */
  def embed(token: String, dim: Int = DefaultDim): Array[Double] = {
    val base = tokenHash(token)
    val inv = 1.0 / math.sqrt(dim.toDouble)
    Array.tabulate(dim) { d =>
      if ((mix64(base ^ (d.toLong * 0x9E3779B97F4A7C15L)) & 1L) == 0L) inv else -inv
    }
  }

  /** The fixed normalized non-zero vector for empty token sets (paper §4.3). */
  def missingVector(dim: Int = DefaultDim): Array[Double] = {
    val inv = 1.0 / math.sqrt(dim.toDouble)
    Array.fill(dim)(inv)
  }

  /** Summed embeddings of a token set (paper Eq. 3: sum, no RNN/attention).
    * Empty input returns [[missingVector]]. */
  def embedSum(tokens: Seq[String], dim: Int = DefaultDim): Array[Double] =
    if (tokens.isEmpty) missingVector(dim)
    else {
      val acc = new Array[Double](dim)
      tokens.foreach { t =>
        val e = embed(t, dim)
        var i = 0
        while (i < dim) { acc(i) += e(i); i += 1 }
      }
      acc
    }

  /** Mean of token embeddings — used by baselines that average rather than
    * sum (keeps magnitudes comparable across value lengths). */
  def embedMean(tokens: Seq[String], dim: Int = DefaultDim): Array[Double] =
    if (tokens.isEmpty) missingVector(dim)
    else {
      val s = embedSum(tokens, dim)
      val inv = 1.0 / tokens.size
      var i = 0
      while (i < dim) { s(i) *= inv; i += 1 }
      s
    }

  /** Cosine similarity of two token embeddings (token-level alignment in
    * EntityMatcherLite). */
  def cosine(a: Array[Double], b: Array[Double]): Double = {
    var dot = 0.0; var na = 0.0; var nb = 0.0; var i = 0
    while (i < a.length) { dot += a(i) * b(i); na += a(i) * a(i); nb += b(i) * b(i); i += 1 }
    if (na == 0 || nb == 0) 0.0 else dot / math.sqrt(na * nb)
  }
}
