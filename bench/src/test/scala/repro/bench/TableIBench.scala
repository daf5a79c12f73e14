package repro.bench

import repro.SparkSpec
import repro.core.{Angular, Euclidean, Manhattan}
import repro.data.Datasets
import repro.jobs.TableIJob

/** Table I reproduction — dataset statistics at repro scale.
  *
  * Paper Table I:
  *   Adult      n=48,842     m=2/5/10   6 features   Euclidean
  *   CelebA     n=202,599    m=2/4      41 features  Manhattan
  *   Census     n=2,426,116  m=2/7/14   25 features  Manhattan
  *   Lyrics     n=122,448    m=15       50 features  Angular
  *   Synthetic  n=10³–10⁷    m=2–20     2 features   Euclidean
  *
  * Ours differs only in n for CelebA (50k), Census (100k), Lyrics (30k) and
  * the synthetic range (10³–10⁵) — the documented DESIGN.md scale-downs.
  */
class TableIBench extends SparkSpec {

  test("Table I: dataset statistics table regenerates with the paper's shape") {
    val table = TableIJob.render(spark)
    println("\n=== Table I (repro scale) ===")
    println(table)
    // Shape assertions against the paper's rows.
    assert(table.contains("Adult") && table.contains("48842") && table.contains("2/5/10") && table.contains("Euclidean"))
    assert(table.contains("CelebA") && table.contains("2/4") && table.contains("Manhattan"))
    assert(table.contains("Census") && table.contains("2/7/14"))
    assert(table.contains("Lyrics") && table.contains("15") && table.contains("Angular"))
    assert(table.contains("Synthetic") && table.contains("2/20"))
  }

  test("Table I: feature dimensionalities match the paper exactly") {
    assert(Datasets.adultLike(spark, "sex", 100).nFeatures == 6)
    assert(Datasets.celebaLike(spark, "sex", 100).nFeatures == 41)
    assert(Datasets.censusLike(spark, "sex", 100).nFeatures == 25)
    assert(Datasets.lyricsLike(spark, 100).nFeatures == 50)
    assert(Datasets.blobs(spark, 100, 2).nFeatures == 2)
  }

  test("Table I: metrics match the paper exactly") {
    assert(Datasets.adultLike(spark, "sex", 100).metric == Euclidean)
    assert(Datasets.celebaLike(spark, "age", 100).metric == Manhattan)
    assert(Datasets.censusLike(spark, "age", 100).metric == Manhattan)
    assert(Datasets.lyricsLike(spark, 100).metric == Angular)
    assert(Datasets.blobs(spark, 100, 5).metric == Euclidean)
  }
}
