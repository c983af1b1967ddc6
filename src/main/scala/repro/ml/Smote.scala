package repro.ml

import scala.util.Random

/** SMOTE (Chawla et al., 2002): synthetic minority oversampling.
  *
  * The paper applies SMOTE at every M-step of SIMPLE to balance the classes
  * before training the random forest. Synthetic minority points are linear
  * interpolations between a minority point and one of its k nearest minority
  * neighbours.
  */
object Smote {

  /** Returns (xs', ys') with the minority class oversampled to parity.
    * If either class is empty (degenerate pseudo-labels), returns the input.
    */
  def balance(xs: Array[Array[Double]], ys: Array[Int], k: Int = 5,
              seed: Long = 0): (Array[Array[Double]], Array[Int]) = {
    val posIdx = ys.indices.filter(ys(_) == 1).toArray
    val negIdx = ys.indices.filter(ys(_) == 0).toArray
    if (posIdx.isEmpty || negIdx.isEmpty || posIdx.length == negIdx.length) return (xs, ys)

    val (minIdx, minLabel) =
      if (posIdx.length < negIdx.length) (posIdx, 1) else (negIdx, 0)
    val need = math.abs(posIdx.length - negIdx.length)
    val rng  = new Random(seed)
    val minX = minIdx.map(xs)

    def dist2(a: Array[Double], b: Array[Double]): Double = {
      var s = 0.0; var i = 0
      while (i < a.length) { val d = a(i) - b(i); s += d * d; i += 1 }
      s
    }

    // k nearest minority neighbours per minority point (minority sets are
    // small here — the labeling matrix has few positives — so O(n^2) is fine).
    val neigh: Array[Array[Int]] =
      if (minX.length == 1) Array(Array(0))
      else minX.indices.map { i =>
        minX.indices.filter(_ != i)
          .sortBy(j => dist2(minX(i), minX(j)))
          .take(math.min(k, minX.length - 1)).toArray
      }.toArray

    val synth = Array.tabulate(need) { _ =>
      val i   = rng.nextInt(minX.length)
      val j   = neigh(i)(rng.nextInt(neigh(i).length))
      val gap = rng.nextDouble()
      val a = minX(i); val b = minX(j)
      Array.tabulate(a.length)(d => a(d) + gap * (b(d) - a(d)))
    }
    (xs ++ synth, ys ++ Array.fill(need)(minLabel))
  }
}
