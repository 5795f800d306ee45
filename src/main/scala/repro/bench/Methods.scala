package repro.bench

import org.apache.spark.sql.SparkSession
import repro.baselines._
import repro.core.{DistributedBuilder, IRangeGraph}
import repro.data.RfDataset
import repro.graph.Hnsw

/** A built RFANN method: name, cost accounting and a search closure
  * `(q, L, R, k, beam) => result ids` — the uniform interface every bench
  * sweeps over.
  */
final case class BuiltMethod(
    name: String,
    indexBytes: Long,
    buildSeconds: Double,
    usesBeam: Boolean,
    searchFn: (Array[Float], Int, Int, Int, Int) => Array[Int],
)

/** All single-attribute methods of Section 5.1 built over one dataset, with
  * build times measured like-for-like (sequential, same JVM). The Spark
  * 16-way iRangeGraph build is reported as an extra Table 3 row.
  */
final case class MethodSuite(
    ds: RfDataset,
    irg: IRangeGraph,
    hnswAll: Hnsw,
    hnswAllBuildSeconds: Double,
    sparkIrgBuildSeconds: Double,
    serf: SegmentSerf,
    milvus: MilvusLike,
    methods: Seq[BuiltMethod],
) {
  def method(name: String): BuiltMethod = methods.find(_.name == name).get
}

object MethodSuite {

  // Index parameters, scaled from the paper's (m = 16/64, EF = 100/400 at
  // n = 1M) to our n = 8192 — documented in DESIGN.md.
  val M = 16
  val EF = 100
  val MilvusParts = 10
  val SerfGrid = 4
  val VamanaBuckets = 10

  def build(spark: SparkSession, ds: RfDataset): MethodSuite = {
    import BenchUtil.{cpuSeconds, seconds}
    val vs = ds.vs

    // Single-threaded builds use thread CPU time (the host steals vCPU in
    // bursts; see BenchUtil.cpuSeconds). The Spark build is multi-threaded,
    // so wall-clock is the only meaningful measure there.
    val (irgGraphs, tIrg) = cpuSeconds(repro.core.ElementalGraphBuilder.build(vs, M, EF))
    val irg = new IRangeGraph(vs, irgGraphs)
    val (sparkGraphs, tSparkIrg) = seconds(DistributedBuilder.build(spark, vs, M, EF))
    require(sparkGraphs.edgeCount == irgGraphs.edgeCount,
      "Spark and local builds disagree — determinism broken")

    val (hnswAll, tHnsw) = cpuSeconds(Hnsw.buildAll(vs, M, EF))
    val (milvus, tMilvus) = cpuSeconds(MilvusLike.build(vs, MilvusParts, M, EF))
    val (superPost, tSuper) = cpuSeconds(SuperPostFiltering.build(vs, M, EF))
    val (serf, tSerf) = cpuSeconds(SegmentSerf.build(vs, SerfGrid, M, EF))
    val (fVamana, tFv) = cpuSeconds(FilteredVamana.build(vs, VamanaBuckets, M, EF))
    val (sVamana, tSv) = cpuSeconds(StitchedVamana.build(vs, VamanaBuckets, M, EF))

    val methods = Seq(
      BuiltMethod("iRangeGraph", irg.sizeBytes, tIrg, usesBeam = true,
        (q, l, r, k, beam) => irg.search(q, l, r, k, beam).map(_.id)),
      BuiltMethod("2DSegmentGraph", serf.sizeBytes, tSerf, usesBeam = true,
        (q, l, r, k, beam) => serf.search(q, l, r, k, beam).map(_.id)),
      BuiltMethod("FilteredVamana", fVamana.sizeBytes, tFv, usesBeam = true,
        (q, l, r, k, beam) => fVamana.search(q, l, r, k, beam).map(_.id)),
      BuiltMethod("StitchedVamana", sVamana.sizeBytes, tSv, usesBeam = true,
        (q, l, r, k, beam) => sVamana.search(q, l, r, k, beam).map(_.id)),
      BuiltMethod("Milvus", milvus.sizeBytes, tMilvus, usesBeam = true,
        (q, l, r, k, beam) => milvus.search(q, l, r, k, beam).map(_.id)),
      BuiltMethod("SuperPostfiltering", superPost.sizeBytes, tSuper, usesBeam = true,
        (q, l, r, k, beam) => superPost.search(q, l, r, k, beam).map(_.id)),
      BuiltMethod("Pre-filtering", 0L, 0.0, usesBeam = false,
        (q, l, r, k, _) => PreFiltering.search(vs, q, l, r, k).map(_.id)),
    )
    MethodSuite(ds, irg, hnswAll, tHnsw, tSparkIrg, serf, milvus, methods)
  }
}
