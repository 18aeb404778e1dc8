package repro.bench

import repro.SparkSpec
import repro.tables.TableVII

/** Reproduces Table VII: the memory-tunable index under device budgets —
  * the paper's {15, 20, 30} MB at n = 10^6 scaled 1:10 to {1.5, 2, 3} MB at
  * n = 10^5. More memory ⇒ smaller leaf capacity f ⇒ more pruned vectors.
  */
class TableVIIBench extends SparkSpec {

  private lazy val rows = TableVII.run(spark)

  test("produce and record Table VII") {
    BenchOut.write("table_vii.txt", TableVII.render(rows))
    assert(rows.size == 6 * 3 * 3)
  }

  test("a larger budget yields a smaller leaf capacity (Eq. 12)") {
    rows.groupBy(r => (r.dataset, r.k)).foreach { case (key, group) =>
      val byBudget = group.sortBy(_.budgetMb)
      val fs = byBudget.map(_.leafCapacity)
      assert(fs == fs.sorted(Ordering[Int].reverse), s"$key: f not decreasing: $fs")
    }
  }

  test("more memory prunes at least as many vectors at large k (paper's trend)") {
    var improvements = 0; var total = 0
    rows.filter(_.k >= 1000).groupBy(r => (r.dataset, r.k)).foreach { case (_, group) =>
      val byBudget = group.sortBy(_.budgetMb)
      total += 1
      if (byBudget.last.prunedVectors >= byBudget.head.prunedVectors) improvements += 1
    }
    assert(improvements.toDouble / total >= 0.5, s"pruning improved with memory in only $improvements/$total settings")
  }

  test("pruned vectors stay within the n × iterations ceiling") {
    rows.foreach(r => assert(r.prunedVectors <= 100_000L * 10, s"${r.dataset}: ${r.prunedVectors}"))
  }

  test("runtime grows with k in most settings (paper: smaller k converges faster)") {
    // individual sub-second cells are JIT/GC-noisy; require the trend in a
    // majority of (dataset, budget) settings rather than every one
    val groups = rows.groupBy(r => (r.dataset, r.budgetMb)).values
    val holds = groups.count { group =>
      val byK = group.sortBy(_.k)
      byK.last.runtimeSec > byK.head.runtimeSec * 0.8
    }
    assert(holds.toDouble / groups.size >= 0.6, s"k-trend holds in only $holds/${groups.size} settings")
  }
}
