package repro.jobs

import repro.BipartiteGen
import repro.harness.Tables

/** Calibration helper: prints the analytic shape statistics (peel/count
  * wedge ratios `r`) of every synthetic dataset, so their skew parameters
  * can be tuned to sit in the same regimes as the paper's graphs
  * (r ≫ 1000 for ItU/LjU/EnU/TrU, r < 5 for the V sides).
  */
object ShapeCheck {
  def main(args: Array[String]): Unit = {
    println(f"| name | m | Λpeel_U | Λpeel_V | Λcnt | r_U | r_V |")
    BipartiteGen.datasets.foreach { cfg =>
      val s = Tables.shapeStats(cfg)
      println(f"| ${s.name} | ${s.m}%,d | ${s.peelU}%,d | ${s.peelV}%,d | ${s.cnt}%,d | ${s.rU}%.1f | ${s.rV}%.2f |")
    }
  }
}
