package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.eval.{Harness, MethodRunner}

/** Exploratory probe (not a table bench): prints all nine methods on one
  * music scenario and the monitor scenario so hyperparameters/generators can
  * be sanity-checked quickly. Keeps no assertions beyond validity.
  */
class CalibrationProbe extends AnyFunSuite {
  import BenchDatasets._

  test("probe: music-3k artist overlapping + disjoint") {
    for (disjoint <- Seq(false, true)) {
      val data = music3k("artist", disjoint)
      println(s"=== ${data.name} (train=${data.train.n} pos=${data.train.positives.n}, test=${data.test.n} pos=${data.test.positives.n}) ===")
      MethodRunner.all(dim, 0L, adamelCfg).foreach { proto =>
        val res = Harness.evalPRAUC(data,
          s => MethodRunner.all(dim, s, adamelCfg).find(_.name == proto.name).get, seeds = Seq(1L))
        println(f"${proto.name}%-20s ${res.mean}%.4f")
      }
    }
  }

  test("probe: monitor overlapping") {
    val data = monitor(disjoint = false)
    println(s"=== ${data.name} (train=${data.train.n} pos=${data.train.positives.n}, test=${data.test.n} pos=${data.test.positives.n}) ===")
    MethodRunner.all(dim, 0L, adamelCfg).foreach { proto =>
      val res = Harness.evalPRAUC(data,
        s => MethodRunner.all(dim, s, adamelCfg).find(_.name == proto.name).get, seeds = Seq(1L))
      println(f"${proto.name}%-20s ${res.mean}%.4f")
    }
  }
}
