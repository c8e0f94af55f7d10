package repro.bench

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.graph.LocalGraph

/** The 16 synthetic stand-ins: canonical, non-trivial, deterministic. */
class DatasetsSpec extends SparkSpec {

  for (spec <- Datasets.all) {
    test(s"${spec.name} (${spec.summary}) generates a canonical non-trivial graph") {
      val df = spec.gen(spark, 0.5).cache()
      assert(df.where(col("src") >= col("dst")).count() == 0)
      assert(df.count() == df.distinct().count())
      val g = LocalGraph.fromDF(df)
      assert(g.m >= 50, s"${spec.name} too small: ${g.m}")
      assert(g.n >= 10)
      df.unpersist()
    }
  }

  test("generation is deterministic per dataset") {
    val a = Datasets.byName("PR").gen(spark, 0.5).collect().toSet
    val b = Datasets.byName("PR").gen(spark, 0.5).collect().toSet
    assert(a == b)
  }

  test("scale grows the graphs") {
    val small = Datasets.byName("EM").gen(spark, 0.3).count()
    val big = Datasets.byName("EM").gen(spark, 1.0).count()
    assert(big > small)
  }

  test("byName rejects unknown datasets") {
    intercept[NoSuchElementException](Datasets.byName("nope"))
  }

  test("all 16 paper datasets are represented") {
    assert(Datasets.all.map(_.name).toSet ==
      Set("CA", "FA", "PR", "EM", "DB", "AM", "CN", "YO", "SK", "EU", "ES", "LJ", "HO", "IC", "U2", "U5"))
  }
}
