package repro.data

import org.apache.spark.sql.{DataFrame, functions => F}
import repro.er.Pairing

/** Assembles the four pair DataFrames of a MEL experiment (paper §5.2 setup)
  * from a record DataFrame and a seen-source set.
  *
  * Overlapping scenario (S1): target pairs have at least one record from an
  * unseen source (the paper tests "on all sources" with pairs in
  * D_S* x D_T*). Disjoint scenario (S2): both records are from unseen
  * sources (D_T* x D_T*).
  *
  * All sampling is hash-ordered and therefore deterministic in `seed`.
  */
final case class ScenarioConfig(
    nTrainPos: Int = 150,
    nTrainNeg: Int = 300,
    nSupport: Int = 100, // 50 positive + 50 negative, as §5.2
    nTestPos: Int = 250,
    nTestNeg: Int = 300,
    nTargetExtra: Int = 400, // unlabeled target pairs beyond the test set
    disjoint: Boolean = false,
    blockAttr: String = "name",
    maxBlockSize: Int = 50,
    seed: Long = 7L,
)

final case class MELSplits(train: DataFrame, support: DataFrame,
                           target: DataFrame, test: DataFrame)

object Scenarios {

  def build(records: DataFrame, seenSources: Set[String], cfg: ScenarioConfig): MELSplits =
    buildSplit(records, records, seenSources, cfg)

  /** Variant with distinct record pools: `trainRecords` supplies the labeled
    * source-domain pairs (e.g. the weakly-labeled Music-1M corpus), while
    * support/target/test come from `evalRecords` (the clean labels) — the
    * paper's "Music-1M shares the same testing set as Music-3K" protocol.
    * The two pools must share the record universe (same ids/sources). */
  def buildSplit(trainRecords: DataFrame, evalRecords: DataFrame,
                 seenSources: Set[String], cfg: ScenarioConfig): MELSplits = {
    def pools(records: DataFrame): (DataFrame, DataFrame) = {
      val pos = Pairing.positives(records)
      val hard = Pairing.hardNegatives(records, cfg.blockAttr, cfg.maxBlockSize)
      val rand = Pairing.randomNegatives(records, cfg.seed * 31 + 5)
      (pos, hard.unionByName(rand).dropDuplicates("id1", "id2"))
    }
    val seen1 = F.col("src1").isin(seenSources.toSeq: _*)
    val seen2 = F.col("src2").isin(seenSources.toSeq: _*)
    val inSource = seen1 && seen2
    val inTarget = if (cfg.disjoint) !seen1 && !seen2 else !seen1 || !seen2

    val (trainPosPool, trainNegPool) = pools(trainRecords)
    val trainPos = Pairing.sample(trainPosPool.where(inSource), cfg.nTrainPos, cfg.seed + 1)
    val trainNeg = Pairing.sample(trainNegPool.where(inSource), cfg.nTrainNeg, cfg.seed + 2)
    val train = Pairing.finalizePairs(Seq(trainPos, trainNeg))

    val (pos, neg) = pools(evalRecords)

    val tgtPos = pos.where(inTarget)
    val tgtNeg = neg.where(inTarget)
    val testPos = Pairing.sample(tgtPos, cfg.nTestPos, cfg.seed + 3)
    val testNeg = Pairing.sample(tgtNeg, cfg.nTestNeg, cfg.seed + 4)
    val test = Pairing.finalizePairs(Seq(testPos, testNeg))

    val key = Seq("id1", "id2")
    val supPos = Pairing.sample(
      tgtPos.join(testPos.select("id1", "id2"), key, "left_anti"), cfg.nSupport / 2, cfg.seed + 5)
    val supNeg = Pairing.sample(
      tgtNeg.join(testNeg.select("id1", "id2"), key, "left_anti"), cfg.nSupport / 2, cfg.seed + 6)
    val support = Pairing.finalizePairs(Seq(supPos, supNeg))

    // D_T: the unlabeled target domain — the test pairs plus extra unlabeled
    // pairs from the same pool (transductive adaptation, as Algorithm 1).
    val extraPos = Pairing.sample(tgtPos, cfg.nTargetExtra / 4, cfg.seed + 7)
    val extraNeg = Pairing.sample(tgtNeg, cfg.nTargetExtra, cfg.seed + 8)
    val target = Pairing.finalizePairs(Seq(testPos, testNeg, extraPos, extraNeg), unlabel = true)

    MELSplits(train, support, target, test)
  }

  /** Single-domain splits for the Table 7 benchmarks: there is no unseen
    * source, so train/support/test are disjoint samples of the same
    * two-catalog pair pool, and the target domain is the unlabeled test
    * distribution. (This is the "no C1-C3" control the paper uses to expose
    * AdaMEL's limitation, §5.7.2.) */
  def buildSingleDomain(records: DataFrame, cfg: ScenarioConfig): MELSplits = {
    val pos = Pairing.positives(records)
    val hard = Pairing.hardNegatives(records, cfg.blockAttr, cfg.maxBlockSize)
    val rand = Pairing.randomNegatives(records, cfg.seed * 31 + 5)
    val neg = hard.unionByName(rand).dropDuplicates("id1", "id2")
    val key = Seq("id1", "id2")

    val testPos = Pairing.sample(pos, cfg.nTestPos, cfg.seed + 3)
    val testNeg = Pairing.sample(neg, cfg.nTestNeg, cfg.seed + 4)
    val test = Pairing.finalizePairs(Seq(testPos, testNeg))

    val remPos = pos.join(testPos.select(key.map(F.col): _*), key, "left_anti")
    val remNeg = neg.join(testNeg.select(key.map(F.col): _*), key, "left_anti")
    val supPos = Pairing.sample(remPos, cfg.nSupport / 2, cfg.seed + 5)
    val supNeg = Pairing.sample(remNeg, cfg.nSupport / 2, cfg.seed + 6)
    val support = Pairing.finalizePairs(Seq(supPos, supNeg))

    val trainPos = Pairing.sample(
      remPos.join(supPos.select(key.map(F.col): _*), key, "left_anti"), cfg.nTrainPos, cfg.seed + 1)
    val trainNeg = Pairing.sample(
      remNeg.join(supNeg.select(key.map(F.col): _*), key, "left_anti"), cfg.nTrainNeg, cfg.seed + 2)
    val train = Pairing.finalizePairs(Seq(trainPos, trainNeg))

    val target = Pairing.finalizePairs(Seq(testPos, testNeg), unlabel = true)
    MELSplits(train, support, target, test)
  }
}
