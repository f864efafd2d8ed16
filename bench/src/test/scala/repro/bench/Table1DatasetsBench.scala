package repro.bench

import repro.synth.LiteDatasets

/** Table I analog: statistics of the six synthetic dataset analogs next
  * to the paper's originals (see DESIGN.md §4 for the substitution).
  */
class Table1DatasetsBench extends BenchHarness {

  // paper Table I: name -> (n, m, d_max)
  private val paper = Map(
    "Themarker" -> (69414L, 3289686L, 8930),
    "Google" -> (875713L, 8644102L, 6332),
    "DBLP" -> (1843615L, 16700518L, 2213),
    "Flixster" -> (2523387L, 15837602L, 1474),
    "Pokec" -> (1632803L, 44603928L, 14854),
    "Aminer" -> (423469L, 2462224L, 712))

  test("Table I: dataset statistics (paper vs analog)") {
    val rows = LiteDatasets.specs.map { s =>
      val g = BenchData.graph(spark, s.name)
      val (pn, pm, pd) = paper(s.paperName)
      val aCnt = g.attr.count(_ == 0)
      Seq(s.name, g.n.toString, g.m.toString, g.maxDegree.toString,
        s"$aCnt/${g.n - aCnt}",
        s.paperName, pn.toString, pm.toString, pd.toString)
    }
    printTable("Table I — dataset statistics",
      Seq("analog", "n", "m", "d_max", "attrs a/b", "paper", "paper n", "paper m", "paper d_max"),
      rows)
    assert(rows.length == 6)
  }
}
