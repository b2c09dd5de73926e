package repro.spark

import repro.{SparkSpec, TestUtil}
import repro.core.PdxLayout
import repro.data.VectorData
import repro.prune.Bond

class PdxSparkSpec extends SparkSpec {

  private lazy val ds = VectorData.generate(
    VectorData.DatasetSpec("spark", 24, 800, 6, skewed = false, clusters = 8, seed = 500))

  test("pack produces blocks covering every vector exactly once") {
    val df = PdxSpark.toVectorDF(spark, ds.vectors, numPartitions = 4)
    val blocks = PdxSpark.pack(df, blockSize = 64).collect()
    assert(blocks.map(_.n).sum == 800)
    assert(blocks.forall(_.n <= 64))
    assert(blocks.forall(_.d == 24))
    val ids = blocks.flatMap(_.ids).sorted
    assert(ids.toSeq == (0L until 800L))
  }

  test("packed blocks reconstruct the original vectors") {
    val df = PdxSpark.toVectorDF(spark, ds.vectors, numPartitions = 3)
    val blocks = PdxSpark.pack(df, blockSize = 32).collect()
    blocks.foreach { row =>
      val b = row.toBlock
      PdxLayout.unpack(b).foreach { case (id, v) =>
        assert(v.toSeq == ds.vectors(id.toInt).toSeq, s"vector $id corrupted")
      }
    }
  }

  test("pack respects suffix-norm request") {
    val df = PdxSpark.toVectorDF(spark, ds.vectors.take(100), numPartitions = 2)
    val plain = PdxSpark.pack(df, 64).collect()
    assert(plain.forall(_.suffix.isEmpty))
    val withS = PdxSpark.pack(df, 64, withSuffixNorms = true).collect()
    assert(withS.forall(r => r.suffix.length == r.n * (r.d + 1)))
  }

  for (parts <- Seq(1, 4)) {
    test(s"distributed knnExact equals local brute force ($parts partitions)") {
      val df = PdxSpark.toVectorDF(spark, ds.vectors, numPartitions = parts)
      val blocks = PdxSpark.pack(df, 64).cache()
      ds.queries.foreach { q =>
        val res = PdxSpark.knnExact(blocks, q, 10).collect()
          .map(r => (r.getLong(0), r.getDouble(1).toFloat)).toSeq
        TestUtil.assertExactKnn(res, ds.vectors, q, 10)
      }
      blocks.unpersist()
    }
  }

  test("distributed knnBond equals knnExact (exact pruning under parallelism)") {
    val df = PdxSpark.toVectorDF(spark, ds.vectors, numPartitions = 4)
    val blocks = PdxSpark.pack(df, 64).cache()
    ds.queries.foreach { q =>
      val exact = PdxSpark.knnExact(blocks, q, 10).collect().map(_.getLong(0)).toSet
      val bond = PdxSpark.knnBond(blocks, q, 10, Bond.DistanceToMeans).collect().map(_.getLong(0)).toSet
      assert(bond == exact)
    }
    blocks.unpersist()
  }

  test("rangeCount matches a local count") {
    val df = PdxSpark.toVectorDF(spark, ds.vectors, numPartitions = 4)
    val blocks = PdxSpark.pack(df, 64)
    val q = ds.queries.head
    val dists = ds.vectors.map(v => repro.core.Kernels.l2Ref(v, q))
    val r2 = dists.sorted.apply(100) + 1e-6 // radius capturing ~101 vectors
    val got = PdxSpark.rangeCount(blocks, q, r2).collect().head.getLong(0)
    val expect = dists.count(_ < r2)
    assert(got == expect, s"got $got expect $expect")
  }

  test("pdx_block_knn UDF returns the block-local top-k through Spark SQL") {
    PdxSpark.registerUdf(spark)
    val vecs = ds.vectors.take(200)
    val df = PdxSpark.toVectorDF(spark, vecs, numPartitions = 2)
    PdxSpark.pack(df, 64).createOrReplaceTempView("pdx_blocks")
    val q = ds.queries.head
    val qSql = q.map(x => s"CAST($x AS FLOAT)").mkString("array(", ", ", ")")
    val res = spark.sql(
      s"""SELECT r.col._1 AS id FROM (
         |  SELECT explode(pdx_block_knn(data, n, d, ids, $qSql, 10)) AS col FROM pdx_blocks
         |) r
         |ORDER BY r.col._2, r.col._1 LIMIT 10""".stripMargin
    ).collect().map(_.getLong(0)).toSet
    val gt = VectorData.groundTruth(vecs.toIndexedSeq, IndexedSeq(q), 10).head.toSet
    assert(res == gt)
  }

  test("knnExact works with SynthData.embeddings input") {
    val df = repro.SynthData.embeddings(spark, n = 500, d = 16, clusters = 8, seed = 77)
    val blocks = PdxSpark.pack(df, 64).cache()
    val local = df.collect().map(r => (r.getLong(0), r.getSeq[Float](1).toArray))
      .sortBy(_._1).map(_._2).toIndexedSeq
    val q = local.head // self-query: nearest must include id 0 at distance 0
    val res = PdxSpark.knnExact(blocks, q, 5).collect()
    assert(res.head.getLong(0) == 0L)
    assert(res.head.getDouble(1) < 1e-6)
    TestUtil.assertExactKnn(res.map(r => (r.getLong(0), r.getDouble(1).toFloat)).toSeq, local, q, 5)
    blocks.unpersist()
  }
}
