package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.data.SciData
import repro.experiments.TableI

/** Table I: the dataset registry (synthetic stand-ins at bench scale).
  * Paper: 10 datasets, 1-D..4-D, 51 MB – 682 GB (we generate laptop-scale
  * equivalents; see DESIGN.md for the substitution table).
  */
class TableIBench extends AnyFunSuite {

  test("Table I: dataset registry") {
    val out = TableI.render()
    println("==== Table I (synthetic stand-ins; paper sizes in EXPERIMENTS.md) ====")
    println(out)
    assert(TableI.rows().length == 10)
    assert(SciData.fields.length == 17)
    // dimensionality mix matches the paper: 1-D, 2-D, 3-D and 4-D present
    assert(TableI.rows().map(_.dim).toSet == Set("1D", "2D", "3D", "4D"))
  }
}
