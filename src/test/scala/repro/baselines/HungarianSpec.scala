package repro.baselines

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

class HungarianSpec extends AnyFunSuite {

  private def bruteForce(cost: Array[Array[Double]]): Double = {
    val n = cost.length
    (0 until n).permutations.map(p => p.zipWithIndex.map { case (j, i) => cost(i)(j) }.sum).min
  }

  test("identity-optimal matrix") {
    val c = Array(
      Array(0.0, 5.0, 9.0),
      Array(5.0, 0.0, 5.0),
      Array(9.0, 5.0, 0.0))
    val (assign, total) = Hungarian.solve(c)
    assert(total == 0.0)
    assert(assign.toSeq == Seq(0, 1, 2))
  }

  test("classic 3x3 example") {
    val c = Array(
      Array(4.0, 1.0, 3.0),
      Array(2.0, 0.0, 5.0),
      Array(3.0, 2.0, 2.0))
    val (_, total) = Hungarian.solve(c)
    assert(total == 5.0) // 1 + 2 + 2
  }

  test("anti-diagonal optimum") {
    val c = Array(
      Array(10.0, 10.0, 1.0),
      Array(10.0, 1.0, 10.0),
      Array(1.0, 10.0, 10.0))
    val (assign, total) = Hungarian.solve(c)
    assert(total == 3.0)
    assert(assign.toSeq == Seq(2, 1, 0))
  }

  test("1x1 matrix") {
    val (assign, total) = Hungarian.solve(Array(Array(7.0)))
    assert(assign.toSeq == Seq(0) && total == 7.0)
  }

  test("assignment is always a permutation") {
    val rng = new Random(3)
    val n = 12
    val c = Array.fill(n, n)(rng.nextDouble() * 100)
    val (assign, _) = Hungarian.solve(c)
    assert(assign.sorted.toSeq == (0 until n))
  }

  for (seed <- 1 to 25)
    test(s"matches brute force on random matrices (seed=$seed)") {
      val rng = new Random(seed)
      val n = 2 + rng.nextInt(6) // up to 7x7
      val c = Array.fill(n, n)(math.floor(rng.nextDouble() * 50) / 2)
      val (assign, total) = Hungarian.solve(c)
      assert(assign.sorted.toSeq == (0 until n))
      val expected = bruteForce(c)
      assert(math.abs(total - expected) < 1e-9, s"n=$n got=$total expected=$expected")
    }

  test("handles ties deterministically (all-equal matrix)") {
    val c = Array.fill(5, 5)(3.0)
    val (assign, total) = Hungarian.solve(c)
    assert(assign.sorted.toSeq == (0 until 5))
    assert(total == 15.0)
  }

  test("rejects empty and ragged matrices") {
    intercept[IllegalArgumentException](Hungarian.solve(Array.empty[Array[Double]]))
    intercept[IllegalArgumentException](Hungarian.solve(Array(Array(1.0, 2.0), Array(3.0))))
  }
}
