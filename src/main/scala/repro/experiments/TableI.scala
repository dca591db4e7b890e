package repro.experiments

import repro.data.SciData

/** Table I harness: the dataset registry — name, dimensionality, generated
  * size, description — for the synthetic stand-ins (paper sizes alongside,
  * from Table I, for the EXPERIMENTS.md diff).
  */
object TableI {

  final case class Row(name: String, dim: String, sizeBytes: Long, description: String, fields: Int)

  def rows(test: Boolean = false): Seq[Row] = {
    SciData.fields.groupBy(_.dataset).map { case (ds, specs) =>
      val bytes = specs.map(s => (if (test) s.testDims else s.benchDims).product.toLong * 8L).sum
      Row(ds, s"${specs.head.benchDims.length}D", bytes, specs.head.description, specs.length)
    }.toSeq.sortBy(r => SciData.fields.indexWhere(_.dataset == r.name))
  }

  def render(test: Boolean = false): String = {
    val sb = new StringBuilder
    sb.append(f"${"Name"}%-10s ${"Dim"}%-4s ${"Size"}%10s ${"Fields"}%7s  Description\n")
    rows(test).foreach { r =>
      val size =
        if (r.sizeBytes >= (1L << 20)) f"${r.sizeBytes / 1048576.0}%.1fMB"
        else f"${r.sizeBytes / 1024.0}%.1fKB"
      sb.append(f"${r.name}%-10s ${r.dim}%-4s $size%10s ${r.fields}%7d  ${r.description}\n")
    }
    sb.toString
  }
}
