package repro.baselines

import scala.util.Random

/** evoStream (Carnein & Trautmann, BDR'18) — Table 4 baseline: an online
  * micro-cluster phase (threshold-based absorption with decay, like
  * DenStream's) plus an offline *evolutionary* macro-clustering: a population
  * of k-center candidate solutions over the micro-clusters is refined by
  * mutation/recombination during idle time; the fittest (lowest weighted SSQ)
  * solution is the final clustering.
  */
object EvoStream {

  private def sq(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0; var i = 0
    while (i < a.length) { val d = a(i) - b(i); s += d * d; i += 1 }
    s
  }

  def run(points: IndexedSeq[Array[Double]], k: Int, radius: Double,
          lambda: Double = 1e-4, popSize: Int = 8, generations: Int = 60,
          seed: Long = 9): Array[Int] = {
    val rnd = new Random(seed)
    val d   = points.head.length

    // ---- online micro-clusters ---------------------------------------------
    val centers = scala.collection.mutable.ArrayBuffer.empty[Array[Double]]
    val weights = scala.collection.mutable.ArrayBuffer.empty[Double]
    points.foreach { p =>
      var best = Double.PositiveInfinity
      var bi   = -1
      var i    = 0
      while (i < centers.length) {
        val dd = math.sqrt(sq(p, centers(i)))
        if (dd < best) { best = dd; bi = i }
        i += 1
      }
      if (bi >= 0 && best <= radius) {
        weights(bi) += 1
        var j = 0
        while (j < d) { centers(bi)(j) += (p(j) - centers(bi)(j)) / weights(bi); j += 1 }
      } else { centers += p.clone(); weights += 1.0 }
    }
    val mcs = centers.toIndexedSeq
    val ws  = weights.toIndexedSeq
    val kk  = math.min(k, mcs.length)

    // ---- offline evolutionary macro-clustering ------------------------------
    def fitness(sol: IndexedSeq[Array[Double]]): Double = {
      var f = 0.0
      mcs.indices.foreach { i =>
        f += ws(i) * sol.iterator.map(c => sq(mcs(i), c)).min
      }
      f
    }
    def randomSolution(): IndexedSeq[Array[Double]] =
      IndexedSeq.fill(kk)(mcs(rnd.nextInt(mcs.length)).clone())
    var population = IndexedSeq.fill(popSize)(randomSolution()).map(s => (fitness(s), s))
    for (_ <- 0 until generations) {
      // recombine two fit parents + gaussian mutation of one center
      val sorted  = population.sortBy(_._1)
      val parentA = sorted(rnd.nextInt(math.max(1, popSize / 2)))._2
      val parentB = sorted(rnd.nextInt(math.max(1, popSize / 2)))._2
      val child = IndexedSeq.tabulate(kk) { i =>
        val src = if (rnd.nextBoolean()) parentA else parentB
        src(i).clone()
      }
      val mi = rnd.nextInt(kk)
      (0 until d).foreach(j => child(mi)(j) += rnd.nextGaussian() * radius * 0.3)
      val fc = fitness(child)
      val worst = population.indices.maxBy(population(_)._1)
      if (fc < population(worst)._1)
        population = population.updated(worst, (fc, child))
    }
    val bestSol = population.minBy(_._1)._2

    points.map { p =>
      var best = 0; var bd = Double.PositiveInfinity
      bestSol.indices.foreach { c =>
        val dd = sq(p, bestSol(c)); if (dd < bd) { bd = dd; best = c }
      }
      best
    }.toArray
  }
}
