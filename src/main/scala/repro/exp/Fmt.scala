package repro.exp

import repro.core.PRF

/** Markdown table rendering for bench output and jobs. */
object Fmt {

  def table(header: Seq[String], rows: Seq[Seq[String]]): String = {
    val sb = new StringBuilder
    sb.append(header.mkString("| ", " | ", " |\n"))
    sb.append(header.map(_ => "---").mkString("| ", " | ", " |\n"))
    rows.foreach(r => sb.append(r.mkString("| ", " | ", " |\n")))
    sb.toString
  }

  def f3(x: Double): String = f"$x%.3f"

  /** "P/R/F1" triple plus the paper's values in parentheses for diffing. */
  def prfCell(m: PRF): String = s"${f3(m.precision)}/${f3(m.recall)}/${f3(m.f1)}"

  def prfWithPaper(m: PRF, paper: (Double, Double, Double)): String =
    s"${prfCell(m)} (paper ${f3(paper._1)}/${f3(paper._2)}/${f3(paper._3)})"
}
