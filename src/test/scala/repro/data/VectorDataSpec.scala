package repro.data

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Kernels

class VectorDataSpec extends AnyFunSuite {

  test("catalog matches the paper's 10 datasets (names and dims)") {
    val specs = VectorData.catalog(1000, 10)
    assert(specs.map(_.d) == Seq(16, 50, 96, 128, 200, 420, 768, 768, 960, 1536))
    assert(specs.count(_.skewed) == 4) // SIFT, MSong, GIST, OpenAI
    assert(specs.map(_.label).distinct.size == 10)
  }

  test("pruningCatalog drops GloVe/200 and arXiv/768") {
    val labels = VectorData.pruningCatalog(100, 5).map(_.label)
    assert(labels.size == 8)
    assert(!labels.contains("GloVe/200") && !labels.contains("arXiv/768"))
  }

  test("generation is deterministic in the spec") {
    val spec = VectorData.DatasetSpec("t", 12, 50, 5, skewed = false, seed = 9)
    val a = VectorData.generate(spec)
    val b = VectorData.generate(spec)
    a.vectors.zip(b.vectors).foreach { case (x, y) => assert(x.toSeq == y.toSeq) }
    a.queries.zip(b.queries).foreach { case (x, y) => assert(x.toSeq == y.toSeq) }
  }

  test("different seeds produce different data") {
    val a = VectorData.generate(VectorData.DatasetSpec("t", 8, 10, 2, skewed = false, seed = 1))
    val b = VectorData.generate(VectorData.DatasetSpec("t", 8, 10, 2, skewed = false, seed = 2))
    assert(a.vectors.head.toSeq != b.vectors.head.toSeq)
  }

  for (skewed <- Seq(false, true)) {
    test(s"generate respects shapes (skewed=$skewed)") {
      val spec = VectorData.DatasetSpec("t", 20, 100, 7, skewed, seed = 5)
      val ds = VectorData.generate(spec)
      assert(ds.vectors.length == 100 && ds.queries.length == 7)
      assert(ds.vectors.forall(_.length == 20) && ds.queries.forall(_.length == 20))
      assert(ds.ids == (0 until 100).map(_.toLong))
    }
  }

  test("skewed datasets are non-negative; normal datasets are not") {
    val sk = VectorData.generate(VectorData.DatasetSpec("t", 16, 200, 2, skewed = true, seed = 6))
    assert(sk.vectors.forall(_.forall(_ >= 0f)))
    val nm = VectorData.generate(VectorData.DatasetSpec("t", 16, 200, 2, skewed = false, seed = 6))
    assert(nm.vectors.exists(_.exists(_ < 0f)))
  }

  test("skewness statistic separates the two distribution classes") {
    val sk = VectorData.generate(VectorData.DatasetSpec("t", 32, 2000, 2, skewed = true, seed = 7))
    val nm = VectorData.generate(VectorData.DatasetSpec("t", 32, 2000, 2, skewed = false, seed = 7))
    val ssk = VectorData.meanAbsSkewness(sk.vectors)
    val snm = VectorData.meanAbsSkewness(nm.vectors)
    assert(ssk > snm, s"skewed=$ssk normal=$snm")
  }

  test("clustered data has distance contrast (near neighbours much closer than far)") {
    val ds = VectorData.generate(VectorData.DatasetSpec("t", 64, 1000, 5, skewed = false, seed = 8))
    val q = ds.queries.head
    val dists = ds.vectors.map(v => Kernels.l2Ref(v, q)).sorted
    assert(dists.head < dists(dists.length / 2) * 0.8, "no distance contrast — pruning would be meaningless")
  }

  test("groundTruth returns sorted exact neighbours") {
    val ds = VectorData.generate(VectorData.DatasetSpec("t", 10, 200, 4, skewed = false, seed = 9))
    val gt = VectorData.groundTruth(ds.vectors, ds.queries, 5)
    assert(gt.length == 4)
    gt.zipWithIndex.foreach { case (ids, qi) =>
      assert(ids.length == 5)
      val q = ds.queries(qi)
      val dists = ids.map(id => Kernels.l2Ref(ds.vectors(id.toInt), q))
      assert(dists.toSeq == dists.sorted.toSeq)
      // No non-member is strictly closer than the k-th member.
      val kth = dists.max
      val better = ds.vectors.indices.count(i => Kernels.l2Ref(ds.vectors(i), q) < kth)
      assert(better <= 5)
    }
  }

  test("recall is the intersection fraction") {
    assert(VectorData.recall(Seq(1L, 2L, 3L), Array(1L, 2L, 4L)) == 2.0 / 3.0)
    assert(VectorData.recall(Seq.empty, Array(1L)) == 0.0)
    assert(VectorData.recall(Seq(5L), Array(5L)) == 1.0)
  }

  test("gaussian generator is deterministic and shaped") {
    val a = VectorData.gaussian(10, 4, 1)
    val b = VectorData.gaussian(10, 4, 1)
    assert(a.length == 10 && a.head.length == 4)
    a.zip(b).foreach { case (x, y) => assert(x.toSeq == y.toSeq) }
  }
}
