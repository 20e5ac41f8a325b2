package repro.core

import scala.util.Random

/** Deterministic synthetic spatial data sources.
  *
  * The paper evaluates on five open-portal data sources (Table I) whose
  * datasets are route/region-shaped point collections with strong spatial
  * locality. We substitute seeded random-walk "routes": each dataset is a
  * walk of `len` points with a per-dataset start drawn from a handful of
  * per-source hot regions, which reproduces the heatmap-style clustering
  * of Fig. 7 (dense hubs, sparse tails) that the index pruning exploits.
  *
  * Everything is a pure function of (spec, seed) so the pure-Scala core,
  * the Spark layer, and the DuckDB oracle all see identical data.
  */
object SynthSpatial {

  /** One spatial dataset: an ID and its raw points. */
  final case class RawDataset(id: Int, points: Array[Point]) extends Serializable

  /** Generation spec for one data source (mirrors one Table I row).
    *
    * @param sourceId   stable source identifier
    * @param nDatasets  number of datasets in the source
    * @param avgPoints  mean points per dataset (actual size varies ±50%)
    * @param region     lon/lat region the source's data lives in
    * @param nHubs      number of dense hub regions within `region`
    */
  final case class SourceSpec(sourceId: Int, name: String, nDatasets: Int,
                              avgPoints: Int, region: MBR, nHubs: Int = 6)
      extends Serializable

  /** Generate the points of dataset `id` of source `spec` — deterministic
    * in (spec, id, seed), independent of every other dataset.
    */
  def dataset(spec: SourceSpec, id: Int, seed: Long = 42L): RawDataset = {
    val rnd = new Random(seed * 1_000_003L + spec.sourceId * 7919L + id)
    val r = spec.region
    val w = r.maxX - r.minX; val h = r.maxY - r.minY
    // Hub centres are a function of the source alone, so all datasets of a
    // source share them (this is what creates inter-dataset overlap).
    val hubRnd = new Random(seed * 31L + spec.sourceId)
    val hubs = Array.fill(spec.nHubs)(
      Point(r.minX + hubRnd.nextDouble() * w, r.minY + hubRnd.nextDouble() * h))
    val hub = hubs(rnd.nextInt(hubs.length))
    // Start near the chosen hub; walk with steps ~ region/400.
    var x = hub.x + (rnd.nextGaussian() * w / 40)
    var y = hub.y + (rnd.nextGaussian() * h / 40)
    val len = math.max(2, (spec.avgPoints * (0.5 + rnd.nextDouble())).toInt)
    var heading = rnd.nextDouble() * 2 * math.Pi
    val step = (w + h) / 800
    val pts = new Array[Point](len)
    var i = 0
    while (i < len) {
      x = math.min(r.maxX, math.max(r.minX, x))
      y = math.min(r.maxY, math.max(r.minY, y))
      pts(i) = Point(x, y)
      heading += (rnd.nextDouble() - 0.5) * 0.8
      x += math.cos(heading) * step * (0.5 + rnd.nextDouble())
      y += math.sin(heading) * step * (0.5 + rnd.nextDouble())
      i += 1
    }
    RawDataset(id, pts)
  }

  /** All datasets of one source. */
  def source(spec: SourceSpec, seed: Long = 42L): IndexedSeq[RawDataset] =
    (0 until spec.nDatasets).map(id => dataset(spec, id, seed))

  /** Cell-based datasets (Def. 5) of one source under `grid`. */
  def cellSource(spec: SourceSpec, grid: Grid, seed: Long = 42L): IndexedSeq[(Int, Array[Long])] =
    source(spec, seed).map(d => d.id -> grid.cellSet(d.points))

  /** The five experiment sources: the paper's Table I portals at 1/10 of
    * the dataset counts (same ratios), each with its own coordinate range
    * (approximating Table I's ranges).
    */
  def paperSources(scale: Double = 0.1): IndexedSeq[SourceSpec] = {
    def n(full: Int) = math.max(4, (full * scale).round.toInt)
    IndexedSeq(
      SourceSpec(0, "Baidu",   n(6581), 220, MBR(87.5, 20.0, 127.1, 46.3), nHubs = 28),
      SourceSpec(1, "BTAA",    n(3204), 380, MBR(-97.0, 36.0, -80.0, 49.0), nHubs = 10),
      SourceSpec(2, "NYU",     n(1093), 300, MBR(-80.0, 35.0, -70.0, 45.0), nHubs = 8),
      SourceSpec(3, "Transit", n(1967), 160, MBR(-77.7, 36.8, -74.5, 39.8), nHubs = 6),
      SourceSpec(4, "UMN",     n(5453), 260, MBR(-98.0, 42.0, -88.0, 50.0), nHubs = 10),
    )
  }

  /** Tiny sources for unit tests. */
  def testSources(nSources: Int = 3, nDatasets: Int = 30, avgPoints: Int = 40): IndexedSeq[SourceSpec] =
    (0 until nSources).map { s =>
      SourceSpec(s, s"test$s", nDatasets, avgPoints,
                 MBR(-50 + 25.0 * s, -20, -20 + 25.0 * s, 10), nHubs = 4)
    }
}
