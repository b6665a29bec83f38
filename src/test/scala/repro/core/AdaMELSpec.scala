package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.er.TestPairs
import repro.eval.Metrics

class AdaMELSpec extends AnyFunSuite {

  private val dim = 16
  private def cfg(v: Variant, epochs: Int = 80) =
    AdaMELConfig(variant = v, epochs = epochs, seed = 3)

  private lazy val train = TestPairs.separable(120, dim, seed = 1)
  private lazy val test = TestPairs.separable(60, dim, seed = 2)

  test("attention rows sum to one (simplex invariant, Eq. 5-6)") {
    val m = new AdaMEL(cfg(Variant.Base, epochs = 1), dim, train.featureNames)
    m.fit(train)
    val att = m.forwardPlain(test)._1
    for (r <- 0 until att.rows) {
      assert(math.abs((0 until att.cols).map(att(r, _)).sum - 1.0) < 1e-9)
    }
  }

  test("scores are probabilities in (0,1)") {
    val m = AdaMEL.fitted(cfg(Variant.Base, 10), train)
    assert(m.scores(test).forall(s => s > 0 && s < 1))
  }

  test("base loss decreases during training (Eq. 8)") {
    val m = new AdaMEL(cfg(Variant.Base), dim, train.featureNames)
    val losses = m.fit(train)
    assert(losses.last < losses.head * 0.5, s"losses ${losses.head} -> ${losses.last}")
  }

  test("base overfits a separable training set") {
    val m = AdaMEL.fitted(cfg(Variant.Base), train)
    assert(Metrics.prauc(m.scores(train), train.labels) > 0.99)
  }

  test("base generalizes to held-out pairs of the same distribution") {
    val m = AdaMEL.fitted(cfg(Variant.Base), train)
    assert(Metrics.prauc(m.scores(test), test.labels) > 0.9)
  }

  test("training is deterministic given the seed") {
    val m1 = AdaMEL.fitted(cfg(Variant.Base, 20), train)
    val m2 = AdaMEL.fitted(cfg(Variant.Base, 20), train)
    assert(m1.scores(test).toSeq == m2.scores(test).toSeq)
  }

  test("different seeds give different parameters") {
    val m1 = AdaMEL.fitted(cfg(Variant.Base, 10), train)
    val m2 = AdaMEL.fitted(cfg(Variant.Base, 10).copy(seed = 99), train)
    assert(m1.scores(test).toSeq != m2.scores(test).toSeq)
  }

  test("zero requires a target domain, few a support set, hyb both") {
    intercept[IllegalArgumentException](new AdaMEL(cfg(Variant.Zero), dim, train.featureNames).fit(train))
    intercept[IllegalArgumentException](new AdaMEL(cfg(Variant.Few), dim, train.featureNames).fit(train))
    intercept[IllegalArgumentException](
      new AdaMEL(cfg(Variant.Hyb), dim, train.featureNames).fit(train, Some(test), None))
  }

  test("zero trains with unlabeled target and still solves the task") {
    val m = AdaMEL.fitted(cfg(Variant.Zero), train, target = Some(test))
    assert(Metrics.prauc(m.scores(test), test.labels) > 0.85)
  }

  test("few trains with a support set and solves the task") {
    val support = TestPairs.separable(30, dim, seed = 9)
    val m = AdaMEL.fitted(cfg(Variant.Few), train, support = Some(support))
    assert(Metrics.prauc(m.scores(test), test.labels) > 0.9)
  }

  test("hyb trains with both and solves the task") {
    val support = TestPairs.separable(30, dim, seed = 9)
    val m = AdaMEL.fitted(cfg(Variant.Hyb), train, Some(test), Some(support))
    assert(Metrics.prauc(m.scores(test), test.labels) > 0.9)
  }

  test("adaptation shrinks the source-target attention gap (Q2 mechanism)") {
    // Target domain: informative tokens moved to the other attribute.
    val targetShifted = TestPairs.separable(120, dim, seed = 4, informativeAttr = 1)
    def gap(m: AdaMEL): Double = {
      val aS = m.attention(train); val aT = m.attention(targetShifted)
      aS.zip(aT).map { case (x, y) => math.abs(x - y) }.sum
    }
    val base = AdaMEL.fitted(cfg(Variant.Base), train)
    val zero = AdaMEL.fitted(cfg(Variant.Zero), train, target = Some(targetShifted))
    assert(gap(zero) < gap(base), s"zero gap ${gap(zero)} vs base gap ${gap(base)}")
  }

  test("attention concentrates on the informative attribute's features") {
    val m = AdaMEL.fitted(cfg(Variant.Base), train)
    val att = m.attention(train)
    val names = m.featureNames
    val informative = names.zipWithIndex.filter(_._1.startsWith("attr0")).map(a => att(a._2)).sum
    assert(informative > 0.5, s"attention on attr0 features = $informative")
  }

  test("attentionReport returns top-k sorted feature importances") {
    val m = AdaMEL.fitted(cfg(Variant.Base, 10), train)
    val rep = m.attentionReport(train, topK = 3)
    assert(rep.size == 3)
    assert(rep.sliding(2).forall { case Seq(a, b) => a._2 >= b._2 })
    assert(rep.forall(r => m.featureNames.contains(r._1)))
  }

  test("featureIdx restricts the model to a feature subset (Table 5/6 support)") {
    val idx = Seq(0, 1) // attr0_shared, attr0_unique
    val m = AdaMEL.fitted(cfg(Variant.Base).copy(featureIdx = Some(idx)), train)
    assert(m.numFeatures == 2)
    assert(m.featureNames == Vector("attr0_shared", "attr0_unique"))
    assert(Metrics.prauc(m.scores(test), test.labels) > 0.9) // attr0 is sufficient
  }

  test("shared-only subset on the uninformative attribute performs poorly") {
    val idx = Seq(2, 3) // attr1 features: pure noise
    val m = AdaMEL.fitted(cfg(Variant.Base).copy(featureIdx = Some(idx)), train)
    assert(Metrics.prauc(m.scores(test), test.labels) < 0.8)
  }

  test("parameter count matches the §4.5 formula") {
    val c = cfg(Variant.Base)
    val m = new AdaMEL(c, dim, train.featureNames)
    val f = train.numFeatures
    val expected = f.toLong * (dim * c.h + c.h) + // V_j, b_j
      c.h * c.hPrime + c.hPrime + // W, a
      f * c.h * c.hidden + c.hidden + // W1, b1
      c.hidden + 1 // W2, b2
    assert(m.parameterCount == expected)
  }
}
