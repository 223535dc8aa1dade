package repro.ml

import scala.util.Random

/** Genetic algorithm over unit-hypercube genomes — DAC's search procedure
  * (DAC builds GBRT performance models and searches them with a GA).
  *
  * Minimizes `fitness`. Tournament selection, uniform crossover, Gaussian
  * mutation, elitism of 1.
  */
object Ga {
  final case class Result(best: Array[Double], bestFitness: Double, generations: Int)

  def minimize(fitness: Array[Double] => Double, d: Int, rng: Random,
               popSize: Int = 40, generations: Int = 60,
               crossoverP: Double = 0.9, mutationP: Double = 0.15,
               mutationSd: Double = 0.12): Result = {
    require(d >= 1 && popSize >= 4, "ga needs d>=1, popSize>=4")
    var pop = Array.fill(popSize)(Array.fill(d)(rng.nextDouble()))
    var fit = pop.map(fitness)

    def tournament(): Array[Double] = {
      val a = rng.nextInt(popSize); val b = rng.nextInt(popSize)
      if (fit(a) <= fit(b)) pop(a) else pop(b)
    }

    var g = 0
    while (g < generations) {
      val eliteIdx = fit.indices.minBy(fit)
      val next = scala.collection.mutable.ArrayBuffer[Array[Double]](pop(eliteIdx).clone())
      while (next.size < popSize) {
        val p1 = tournament(); val p2 = tournament()
        val child =
          if (rng.nextDouble() < crossoverP)
            Array.tabulate(d)(i => if (rng.nextBoolean()) p1(i) else p2(i))
          else p1.clone()
        var i = 0
        while (i < d) {
          if (rng.nextDouble() < mutationP)
            child(i) = math.min(1.0, math.max(0.0, child(i) + rng.nextGaussian() * mutationSd))
          i += 1
        }
        next += child
      }
      pop = next.toArray
      fit = pop.map(fitness)
      g += 1
    }
    val bi = fit.indices.minBy(fit)
    Result(pop(bi), fit(bi), generations)
  }
}
