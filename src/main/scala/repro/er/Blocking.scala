package repro.er

import org.apache.spark.sql.{DataFrame, functions => F}

/** Token blocking for candidate-pair generation — the standard ER substrate
  * the paper's pipeline presumes ("techniques such as blocking or hashing
  * are normally applied to merge the candidate entities", §2).
  *
  * Record DataFrames use the aligned-ontology schema
  * `id: long, source: string, entity_id: long, etype: string,
  * attrs: map<string,string>` (`entity_id` is generator ground truth, used
  * only for labeling).
  *
  * Blocking key = first token of a chosen attribute. Oversized blocks
  * (frequent head tokens) are dropped, the usual guard against quadratic
  * blow-up. Candidate generation is a distributed self-join on the key and
  * is Oracle-checked against DuckDB in `BlockingSpec`.
  */
object Blocking {

  /** `id, source, entity_id, key` — one row per distinct token of `attr`
    * (records with a missing value yield no keys). Token blocking over all
    * tokens, not just a prefix, so that pairs sharing *any* rare token (a
    * model code, an abbreviated name) become candidates; frequent tokens are
    * neutralized by the block-size cap in [[candidates]]. */
  def blockKeys(records: DataFrame, attr: String): DataFrame = {
    val toks = F.udf((s: String) => repro.text.Tokenizer.tokenSet(Option(s).getOrElse("")))
    records.select(
      F.col("id"), F.col("source"), F.col("entity_id"),
      F.explode(toks(F.col("attrs").getItem(attr))).as("key"))
  }

  /** Candidate id pairs `(id1 < id2)` sharing a block key, with oversized
    * blocks (> maxBlockSize members) removed. */
  def candidates(records: DataFrame, attr: String, maxBlockSize: Int = 50): DataFrame = {
    val keys = blockKeys(records, attr)
    val sized = keys.groupBy("key").agg(F.count("*").as("block_size"))
      .where(F.col("block_size") <= maxBlockSize)
    val kept = keys.join(sized, "key")
    val l = kept.select(F.col("key"), F.col("id").as("id1"), F.col("entity_id").as("e1"))
    val r = kept.select(F.col("key"), F.col("id").as("id2"), F.col("entity_id").as("e2"))
    l.join(r, "key")
      .where(F.col("id1") < F.col("id2"))
      .select("id1", "id2", "e1", "e2")
      .distinct()
  }
}
