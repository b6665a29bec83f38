package repro.text

/** Word tokenization shared by the driver-side models and the Spark
  * feature pipeline.
  *
  * The paper tokenizes attribute values into word tokens before computing
  * the contrastive `sim`/`uni` sets (Eq. 2) and crops each value to at most
  * `cropSize` tokens (§5.1 uses cropping size 20, following CorDel). We
  * lowercase and split on non-alphanumeric runs; tokens are deduplicated by
  * the set semantics of Eq. 2, not here.
  */
object Tokenizer {
  val CropSize = 20

  def tokens(value: String): Seq[String] =
    if (value == null || value.isEmpty) Seq.empty
    else value.toLowerCase
      .split("[^\\p{L}\\p{N}]+")
      .iterator
      .filter(_.nonEmpty)
      .take(CropSize)
      .toSeq

  /** Distinct tokens, order of first appearance (set semantics for Eq. 2). */
  def tokenSet(value: String): Seq[String] = tokens(value).distinct
}
