package repro.bench

import repro.exp.Experiments

/** Table II: descriptive statistics of the testing dataset.
  *
  * Paper (real DBLP ∩ DAminer): 50 names, 336 authors, 1 529 testing papers;
  * per-name author counts range 2..17. Ours is the synthetic ambiguous-name
  * subset at BENCH_SF — we reproduce the *shape*: tens of testing names,
  * hundreds of authors, author multiplicities in the same band.
  */
class TableIIBench extends BenchSpec {

  test("Table II: testing-set statistics") {
    val t = Experiments.tableII(spark, Bench.corpus).cache()
    val rows = t.collect()
    val totalNames = rows.length
    val totalAuthors = rows.map(_.getLong(1)).sum
    val totalPapers = rows.map(_.getLong(2)).sum

    Bench.banner("Table II")
    println(f"${"Name"}%-16s ${"#Authors_TD"}%12s ${"#Papers_TD"}%11s")
    rows.take(20).foreach(r => println(f"${r.getString(0)}%-16s ${r.getLong(1)}%12d ${r.getLong(2)}%11d"))
    if (rows.length > 20) println(s"... (${rows.length - 20} more names)")
    println(s"Total: $totalNames names, $totalAuthors authors, $totalPapers papers")
    println("Paper: 50 names, 336 authors, 1529 papers (2..17 authors/name)")

    assert(totalNames >= 20, s"testing subset too small: $totalNames names")
    assert(totalAuthors >= 2L * totalNames, "ambiguous names must average >= 2 authors")
    assert(rows.forall(r => r.getLong(1) >= 2 && r.getLong(1) <= 20),
      "authors per name outside the plausible 2..20 band")
    assert(totalPapers > totalAuthors, "authors should average more than one paper")
  }
}
