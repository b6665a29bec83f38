package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{AdaMEL, Variant}
import repro.eval.Metrics

/** Temporary diagnostic: stability of the Monitor scenario across seeds. */
class SupportDiagProbe extends AnyFunSuite {
  import BenchDatasets._

  test("probe: monitor variants across seeds") {
    val data = monitor(disjoint = false)
    for (v <- Variant.all) {
      val runs = Seq(1L, 2L, 3L).map { s =>
        val cfg = adamelCfg.copy(variant = v, seed = s)
        val target = if (v == Variant.Zero || v == Variant.Hyb) Some(data.target) else None
        val support = if (v == Variant.Few || v == Variant.Hyb) Some(data.support) else None
        val m = AdaMEL.fitted(cfg, data.train, target, support)
        Metrics.prauc(m.scores(data.test), data.test.labels)
      }
      println(f"${v.name}%-14s ${runs.map(r => f"$r%.4f").mkString(" ")}  mean=${runs.sum / 3}%.4f")
    }
  }
}
