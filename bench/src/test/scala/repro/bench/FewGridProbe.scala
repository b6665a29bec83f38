package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{AdaMEL, Variant}
import repro.eval.Metrics

/** Temporary: grid over the support-loss knobs on Monitor + attention dumps. */
class FewGridProbe extends AnyFunSuite {
  import BenchDatasets._

  test("probe: few grid on monitor") {
    val data = monitor(disjoint = false)
    def att(m: AdaMEL): String =
      m.attentionReport(data.test, 5).map { case (n, s) => f"$n=$s%.3f" }.mkString(" ")

    val base = AdaMEL.fitted(adamelCfg.copy(variant = Variant.Base, seed = 1L), data.train)
    println(f"base             test=${Metrics.prauc(base.scores(data.test), data.test.labels)}%.4f  ${att(base)}")

    for (phi <- Seq(0.1, 0.3, 1.0); eq12 <- Seq(true, false)) {
      val cfg = adamelCfg.copy(variant = Variant.Few, phi = phi, eq12Weights = eq12, seed = 1L)
      val m = AdaMEL.fitted(cfg, data.train, support = Some(data.support))
      println(f"few phi=$phi%.1f eq12=$eq12%-5s test=${Metrics.prauc(m.scores(data.test), data.test.labels)}%.4f  ${att(m)}")
    }
  }
}
