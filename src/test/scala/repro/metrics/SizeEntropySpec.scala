package repro.metrics

import org.scalatest.funsuite.AnyFunSuite

class SizeEntropySpec extends AnyFunSuite {

  test("single community covering everything has entropy 0") {
    assert(SizeEntropy.of(Seq(100), 100) == 0.0)
  }

  test("two equal halves give ln 2") {
    assert(math.abs(SizeEntropy.of(Seq(50, 50), 100) - math.log(2)) < 1e-12)
  }

  test("many equal communities give higher entropy than few") {
    val few = SizeEntropy.of(Seq(50, 50), 100)
    val many = SizeEntropy.of(Seq.fill(10)(10), 100)
    assert(many > few)
  }

  test("zero-size communities are ignored") {
    assert(SizeEntropy.of(Seq(50, 0, 50), 100) == SizeEntropy.of(Seq(50, 50), 100))
  }

  test("empty list has entropy 0") {
    assert(SizeEntropy.of(Nil, 10) == 0.0)
  }

  test("skewed sizes score below balanced sizes") {
    assert(SizeEntropy.of(Seq(90, 10), 100) < SizeEntropy.of(Seq(50, 50), 100))
  }
}
