package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.harness.Experiments

/** Reproduces Table IV: cost-model calibration R² across three platform
  * regimes. Paper: Local Server 0.897, Alibaba Cloud 0.666, PKU Weiming
  * 0.978 — stable hardware fits well, opaque virtualization degrades R².
  */
class CostModelBench extends AnyFunSuite {

  test("Table IV: calibration R² per platform regime, paper's ordering holds") {
    val rows = Experiments.costModelTable()
    println("== Table IV (paper: local 0.897, cloud 0.666, bare-metal 0.978) ==")
    println(Experiments.formatCostModel(rows))
    val byName = rows.map(r => r.platform.takeWhile(_ != ' ') -> r.r2).toMap
    val measured = byName("container-jvm")
    val cloud    = byName("cloud-vm")
    val metal    = byName("bare-metal")
    assert(metal > measured, s"bare-metal $metal should beat measured $measured")
    assert(measured > cloud, s"measured $measured should beat noisy cloud $cloud")
    assert(metal > 0.9, s"bare-metal regime should fit well, got $metal")
    assert(cloud < 0.85, s"throttled regime should fit poorly, got $cloud")
    assert(measured > 0.3, s"real measurements should carry signal, got $measured")
  }
}
