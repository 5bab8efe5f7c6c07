package repro.bench

import repro.SparkSpec
import repro.data.{Datasets, Queries}
import repro.datalog.{Catalog, Program, ProvQuestion}
import repro.summarize.Summarizer

/** Fig 11 reproduction: total completeness (fraction of provenance covered
  * by at least one pattern of the summary) as k grows, for the Fig 5
  * questions. The paper reaches ~100% with k = 5 for most queries.
  */
class Fig11CompletenessBench extends SparkSpec {

  private def cases: Seq[(String, Program, Catalog, ProvQuestion)] = {
    val lic = Datasets.license(spark, 10000)
    val mov = Datasets.movies(spark, 2000)
    val ml  = Datasets.movielens(spark, 5000)
    val cri = Datasets.crimes(spark, 10000)
    Seq(
      ("r1/why", Queries.r1, lic, Queries.whyR1),
      ("r1/whynot", Queries.r1, lic, Queries.whynotR1),
      ("r2/why", Queries.r2, lic, Queries.whyR2),
      ("r2/whynot", Queries.r2, lic, Queries.whynotR2),
      ("r3/whynot", Queries.r3, mov, Queries.whynotR3),
      ("r4/whynot", Queries.r4, mov, Queries.whynotR4),
      ("r5/why", Queries.r5, cri, Queries.whyR5),
      ("r5/whynot", Queries.r5, cri, Queries.whynotR5),
      ("r6/why", Queries.r6, cri, Queries.whyR6),
      ("r6/whynot", Queries.r6, cri, Queries.whynotR6),
      ("r7/why", Queries.r7, ml, Queries.whyR7),
      ("r7/whynot", Queries.r7, ml, Queries.whynotR7),
      ("r8/why", Queries.r8, ml, Queries.whyR8),
      ("r8/whynot", Queries.r8, ml, Queries.whynotR8),
    )
  }

  test("Fig 11: summary completeness for k in {1, 2, 5, 10}") {
    val ks = Seq(1, 2, 5, 10)
    val rows = cases.map { case (name, prog, cat, pq) =>
      val cps = ks.map { k =>
        val res = Summarizer.summarize(spark, prog, cat, pq,
          Summarizer.Config(nS = 1000, k = k, seed = 19L))
        Bench.f3(res.summary.cpLow)
      }
      name +: cps
    }
    Bench.table("Fig 11 — completeness (cp lower bound) vs k, S1000",
      "case" +: ks.map(k => s"k=$k"), rows)
    assert(rows.size == cases.size)
  }
}
