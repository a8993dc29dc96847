package repro.eval

import org.scalatest.funsuite.AnyFunSuite

class MetricsSpec extends AnyFunSuite {

  test("aape of perfect estimates is zero") {
    val (a, used) = Metrics.aape(Seq((10.0, 10.0), (5.0, 5.0)))
    assert(a == 0.0 && used == 2)
  }

  test("aape averages relative errors") {
    // |10-5|/10 = 0.5 ; |4-5|/4 = 0.25 → mean 0.375
    val (a, used) = Metrics.aape(Seq((10.0, 5.0), (4.0, 5.0)))
    assert(math.abs(a - 0.375) < 1e-12 && used == 2)
  }

  test("aape skips pairs with zero truth") {
    val (a, used) = Metrics.aape(Seq((0.0, 3.0), (10.0, 5.0)))
    assert(used == 1 && math.abs(a - 0.5) < 1e-12)
  }

  test("aape of empty input is zero") {
    assert(Metrics.aape(Nil) == ((0.0, 0)))
  }

  test("aape is symmetric in error direction magnitude") {
    val (over, _)  = Metrics.aape(Seq((10.0, 15.0)))
    val (under, _) = Metrics.aape(Seq((10.0, 5.0)))
    assert(over == under)
  }

  test("armse of perfect estimates is zero") {
    assert(Metrics.armse(Seq((0.5, 0.5), (0.1, 0.1))) == 0.0)
  }

  test("armse computes root mean square error") {
    // errors 0.3 and 0.1 → sqrt((0.09+0.01)/2) = sqrt(0.05)
    val e = Metrics.armse(Seq((0.5, 0.8), (0.2, 0.1)))
    assert(math.abs(e - math.sqrt(0.05)) < 1e-12)
  }

  test("armse of empty input is zero") {
    assert(Metrics.armse(Nil) == 0.0)
  }

  test("armse includes zero-truth pairs (unlike aape)") {
    val e = Metrics.armse(Seq((0.0, 0.2)))
    assert(math.abs(e - 0.2) < 1e-12)
  }

  test("armse dominated by the worst pair") {
    val small = Metrics.armse(Seq.fill(9)((0.5, 0.5)) :+ ((0.0, 1.0)))
    assert(math.abs(small - math.sqrt(0.1)) < 1e-12)
  }
}
