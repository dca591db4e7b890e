package repro.core

import org.scalatest.funsuite.AnyFunSuite

class FieldSpec extends AnyFunSuite {

  test("1-D strides and indexing") {
    val f = Field.of1d(Array(1.0, 2.0, 3.0))
    assert(f.strides.toSeq == Seq(1))
    assert(f.index(Array(2)) == 2)
    assert(f(Array(1)) == 2.0)
  }

  test("2-D strides are row-major") {
    val f = Field(new Array[Double](6), Array(2, 3))
    assert(f.strides.toSeq == Seq(3, 1))
    assert(f.index(Array(1, 2)) == 5)
  }

  test("3-D strides are row-major") {
    val f = Field(new Array[Double](24), Array(2, 3, 4))
    assert(f.strides.toSeq == Seq(12, 4, 1))
    assert(f.index(Array(1, 2, 3)) == 23)
  }

  test("4-D strides are row-major") {
    val f = Field(new Array[Double](120), Array(2, 3, 4, 5))
    assert(f.strides.toSeq == Seq(60, 20, 5, 1))
  }

  test("coords inverts index for every point of a 3-D field") {
    val f = Field(new Array[Double](60), Array(3, 4, 5))
    (0 until 60).foreach { i =>
      assert(f.index(f.coords(i)) == i)
    }
  }

  test("coords inverts index for every point of a 4-D field") {
    val f = Field(new Array[Double](72), Array(2, 3, 3, 4))
    (0 until 72).foreach(i => assert(f.index(f.coords(i)) == i))
  }

  test("minMax and valueRange") {
    val f = Field.of1d(Array(3.0, -1.0, 7.0, 2.0))
    assert(f.minMax == ((-1.0, 7.0)))
    assert(f.valueRange == 8.0)
  }

  test("constant field has zero range and variance") {
    val f = Field.of1d(Array.fill(10)(4.2))
    assert(f.valueRange == 0.0)
    assert(math.abs(f.variance) < 1e-24)
  }

  test("mean and variance") {
    val f = Field.of1d(Array(1.0, 2.0, 3.0, 4.0))
    assert(f.mean == 2.5)
    assert(math.abs(f.variance - 1.25) < 1e-12)
  }

  test("tabulate fills by linear index") {
    val f = Field.tabulate(Array(2, 3))(i => i.toDouble)
    assert(f.data.toSeq == (0 until 6).map(_.toDouble))
  }

  test("copyField is deep") {
    val f = Field.of1d(Array(1.0, 2.0))
    val g = f.copyField
    g.data(0) = 9.0
    assert(f.data(0) == 1.0)
  }

  test("rejects bad shapes") {
    intercept[IllegalArgumentException](Field(new Array[Double](5), Array(2, 3)))
    intercept[IllegalArgumentException](Field(new Array[Double](0), Array.empty[Int]))
    intercept[IllegalArgumentException](Field(new Array[Double](1), Array(1, 1, 1, 1, 1)))
    intercept[IllegalArgumentException](Field(new Array[Double](0), Array(0)))
  }

  test("size matches dims product") {
    assert(Field(new Array[Double](24), Array(2, 3, 4)).size == 24)
  }
}
