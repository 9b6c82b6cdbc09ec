package repro.bench

import repro.core.Metrics
import repro.eval.TableIExample

/** Paper Table I: the worked summarization example. Paper numbers: three
  * paths of total length 13 summarized to a 6-edge subgraph keyed on the
  * "Theo Angelopoulos" and "Drama" hub entities.
  */
class TableIBench extends BenchSupport {

  test("Table I: worked example, paper 13 -> 6 edges") {
    val totalLen = TableIExample.paths.map(_.length).sum
    val s = TableIExample.summary(spark)
    result("table1", s"input_paths=3 total_length=$totalLen (paper 13)")
    result("table1", s"summary_edges=${s.edges.length} (paper 6) summary_nodes=${s.nodes.length} (paper 7)")
    result("table1",
      f"comprehensibility before=${1.0 / totalLen}%.4f after=${Metrics.comprehensibility(s)}%.4f")
    s.edges.foreach(e => result("table1",
      s"edge ${TableIExample.names(e.src)} -> ${TableIExample.names(e.dst)}"))
    assert(totalLen == 13)
    assert(s.edges.length <= 7)
    assert(s.nodes.contains(TableIExample.TheoAngelopoulos))
  }
}
