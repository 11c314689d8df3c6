package repro.core

import repro.util.LongHashSet
import scala.util.Random

/** Offline calibration of the DSD cost model's build/probe ratio α
  * (Appendix A, equation 7): perform k join runs on n table pairs
  * 〈S_i, R_i〉 with |R_i| ≤ |S_i| (the hash table is always built on R_i),
  * time the build and probe phases, and average the per-tuple cost ratio:
  *
  *   α = (1/n) Σ_i (1/k) Σ_j (B_ij·|R_i|⁻¹) / (P_ij·|S_i|⁻¹)
  *
  * The measurement uses the same open-addressing hash set the engine's
  * FAST-DEDUP path uses, so the ratio reflects the actual operator costs.
  */
object DsdCostModel {

  final case class Calibration(alpha: Double, samples: Seq[Double])

  /** Run the equation-(7) training procedure. `sizes` gives |R_i| for the
    * n table pairs; |S_i| = 4·|R_i|.
    */
  def calibrate(
      sizes: Seq[Int] = Seq(20000, 50000, 100000),
      k: Int = 3,
      seed: Long = 1,
  ): Calibration = {
    val rnd = new Random(seed)
    val perPair = sizes.map { rSize =>
      val sSize = rSize * 4
      val r = Array.fill(rSize)(rnd.nextLong() & Long.MaxValue)
      val s = Array.fill(sSize)(rnd.nextLong() & Long.MaxValue)
      val ratios = (0 until k).map { _ =>
        val t0 = System.nanoTime()
        val hs = new LongHashSet(rSize)
        r.foreach(hs.add)
        val t1 = System.nanoTime()
        var hits = 0
        s.foreach(x => if (hs.contains(x)) hits += 1)
        val t2 = System.nanoTime()
        val buildPerTuple = (t1 - t0).toDouble / rSize
        val probePerTuple = math.max(1.0, (t2 - t1).toDouble) / sSize
        buildPerTuple / probePerTuple
      }
      ratios.sum / k
    }
    Calibration(perPair.sum / perPair.size, perPair)
  }
}
