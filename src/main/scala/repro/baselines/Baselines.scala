package repro.baselines

import repro.er.PairData
import repro.text.HashEmbed

/** TLER (Thirumuruganathan et al. 2018): non-deep transfer-ER baseline.
  *
  * Defines a standard per-attribute string-similarity feature space (token
  * Jaccard, containment both ways, exact match, both-present indicator,
  * length ratio) and trains a linear classifier on the seen (source) data,
  * which is then reused unchanged on the new domain — the paper's "reuse
  * and adaptation" framing at its simplest. `hidden = 0` in [[MLPMatcher]]
  * makes this logistic regression.
  */
final class TLER(seed: Long, epochs: Int = 200, lr: Double = 5e-2)
    extends MLPMatcher("TLER", hidden = 0, epochs, lr, seed) {
  override def featurize(p: PairData, attrs: Vector[String]): Array[Double] =
    attrs.indices.flatMap { j =>
      val a = p.toks1(j); val b = p.toks2(j)
      Seq(
        Sim.jaccard(a, b),
        Sim.containment(a, b),
        Sim.containment(b, a),
        if (a.nonEmpty && a == b) 1.0 else 0.0,
        Sim.bothPresent(a, b),
        Sim.lengthRatio(a, b),
      )
    }.toArray
}

/** DeepMatcher-hybrid (Mudgal et al. 2018), reduced: attribute
  * summarization (mean of token embeddings — standing in for the
  * attention-RNN summarizer), attribute similarity representation
  * `[|u - v|, u ⊙ v]` per attribute, then an MLP classifier.
  *
  * Keeps the three-module design (embed / similarity rep / classify) the
  * paper describes; has no attribute-level attention and no adaptation, so
  * it inherits whatever attribute importance the source labels imply —
  * the failure mode AdaMEL targets.
  */
final class DeepMatcherLite(dim: Int, seed: Long, hidden: Int = 32,
                            epochs: Int = 120, lr: Double = 1e-2)
    extends MLPMatcher("DeepMatcher", hidden, epochs, lr, seed) {
  override def featurize(p: PairData, attrs: Vector[String]): Array[Double] = {
    val out = new Array[Double](attrs.length * 2 * dim)
    var j = 0
    while (j < attrs.length) {
      val u = HashEmbed.embedMean(p.toks1(j), dim)
      val v = HashEmbed.embedMean(p.toks2(j), dim)
      var d = 0
      while (d < dim) {
        out(j * 2 * dim + d) = math.abs(u(d) - v(d))
        out(j * 2 * dim + dim + d) = u(d) * v(d)
        d += 1
      }
      j += 1
    }
    out
  }
}

/** EntityMatcher (Fu et al. 2020), reduced: hierarchical matching with
  * cross-attribute token-level alignment.
  *
  * For each attribute, every token of one record aligns to its best match
  * anywhere in the other record (any attribute). With hash embeddings the
  * best-cosine alignment degenerates to exact-token membership (no semantic
  * neighbors — DESIGN.md §2), so the alignment score is computed directly as
  * cross-record token coverage, in both directions, plus the same-attribute
  * Jaccard. This retains the property the paper credits EntityMatcher for:
  * robustness to values drifting across attributes.
  */
final class EntityMatcherLite(seed: Long, hidden: Int = 32,
                              epochs: Int = 120, lr: Double = 1e-2)
    extends MLPMatcher("EntityMatcher", hidden, epochs, lr, seed) {
  override def featurize(p: PairData, attrs: Vector[String]): Array[Double] = {
    val all1 = p.toks1.iterator.flatten.toSet
    val all2 = p.toks2.iterator.flatten.toSet
    attrs.indices.flatMap { j =>
      val a = p.toks1(j); val b = p.toks2(j)
      Seq(
        if (a.isEmpty) 0.0 else a.count(all2).toDouble / a.size, // align r -> r'
        if (b.isEmpty) 0.0 else b.count(all1).toDouble / b.size, // align r' -> r
        Sim.jaccard(a, b),
        Sim.bothPresent(a, b),
      )
    }.toArray
  }
}

/** Ditto (Li et al. 2020), reduced: both records serialized to single token
  * sequences with attribute-name markers (`COL a VAL v ...`), encoded as
  * summed hash embeddings (standing in for the fine-tuned LM encoder), with
  * the classifier over `[u, v, |u - v|, u ⊙ v]`. Ditto's "domain knowledge
  * injection" optimization is modeled as appended per-attribute similarity
  * features (normalized span matches); the TF-IDF summarization is kept in
  * spirit via the tokenizer's crop.
  */
final class DittoLite(dim: Int, seed: Long, hidden: Int = 32,
                      epochs: Int = 120, lr: Double = 1e-2)
    extends MLPMatcher("Ditto", hidden, epochs, lr, seed) {
  private def serialize(toks: Array[Seq[String]], attrs: Vector[String]): Seq[String] =
    attrs.indices.flatMap(j => if (toks(j).isEmpty) Seq.empty else s"col${attrs(j)}" +: toks(j))

  override def featurize(p: PairData, attrs: Vector[String]): Array[Double] = {
    val u = HashEmbed.embedMean(serialize(p.toks1, attrs), dim)
    val v = HashEmbed.embedMean(serialize(p.toks2, attrs), dim)
    val out = new Array[Double](4 * dim + attrs.length)
    var d = 0
    while (d < dim) {
      out(d) = u(d); out(dim + d) = v(d)
      out(2 * dim + d) = math.abs(u(d) - v(d)); out(3 * dim + d) = u(d) * v(d)
      d += 1
    }
    var j = 0
    while (j < attrs.length) { // domain-knowledge spans: per-attribute overlap
      out(4 * dim + j) = Sim.jaccard(p.toks1(j), p.toks2(j))
      j += 1
    }
    out
  }
}

/** CorDel-Attention (Wang et al. 2020), reduced: compare-and-contrast the
  * records *before* embedding — i.e. the same shared/unique token split as
  * AdaMEL's contrastive features (which the AdaMEL paper adopts from
  * CorDel) — then classify the concatenated per-feature embeddings with an
  * MLP. Word-level attention within an attribute collapses under hash
  * embeddings (all tokens are exchangeable), so the summed-embedding variant
  * is used. Crucially there is no attribute-level attention and no domain
  * adaptation: CorDelLite is exactly the "features without the AdaMEL
  * mechanism" foil.
  */
final class CorDelLite(seed: Long, hidden: Int = 32,
                       epochs: Int = 120, lr: Double = 1e-2)
    extends MLPMatcher("CorDel-Attention", hidden, epochs, lr, seed) {
  override def featurize(p: PairData, attrs: Vector[String]): Array[Double] = p.features
}
