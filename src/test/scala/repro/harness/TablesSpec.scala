package repro.harness

import repro.SparkSpec

/** Harness smoke tests: table formatting and the cheapest end-to-end
  * harness (full experiment runs live in bench/).
  */
class TablesSpec extends SparkSpec {

  test("fmt renders an aligned markdown-style table") {
    final case class Row(name: String, v: Double)
    val out = Tables.fmt(Seq(Row("alpha", 1.0), Row("b", 22.12345)), Seq("name", "value"))
    val lines = out.split("\n")
    assert(lines.length == 4)
    assert(lines.head.contains("name") && lines.head.contains("value"))
    assert(lines(2).contains("alpha") && lines(2).contains("1.0000"))
    assert(lines(3).contains("22.1234") || lines(3).contains("22.1235"))
    assert(lines.map(_.length).distinct.size == 1, "columns must align")
  }

  test("row-sharing simulation produces the Figure-1 shape at tiny scale") {
    val rows = Tables.rowSharingSimulation(spark, sizes = Seq(1000L, 8000L), queriesPerSize = 2)
    assert(rows.size == 2)
    // row sharing costs more than result sharing at every size
    assert(rows.forall(r => r.rowSharingMs > r.resultSharingMs))
    // and its cost grows with the table
    assert(rows(1).rowSharingMs > rows(0).rowSharingMs)
  }
}
