package repro.divbase

import repro.core.DiversifyTuples.EmbTuple
import repro.util.Rng

/** Random-k baseline (§6.4.3's sanity check). The experiment harness runs
  * several seeds and scores the best set per metric, as the paper does.
  */
final case class RandomDiv(seed: Long) extends DivAlgo {
  val name = s"Random($seed)"

  def select(cands: Vector[EmbTuple], query: Vector[Array[Double]], k: Int): Vector[EmbTuple] =
    new Rng(seed).shuffle(cands).take(k)
}
