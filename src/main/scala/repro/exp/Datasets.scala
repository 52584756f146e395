package repro.exp

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.SynthData
import repro.graph.{Bipartite, Weights}

/** Scaled-down synthetic analogs of the paper's 11 KONECT datasets
  * (Table I). Sizes are ~1/1000 – ~1/2500 of the originals; relative
  * edge-count ordering and U:L ratio direction follow the paper, and
  * per-dataset skew exponents shape the degeneracy ordering (ML densest,
  * hence largest delta). Weight models per DESIGN.md §4: ML-analog gets
  * ratings, the paper's unweighted DT/PA get the RWR proxy, the rest uniform
  * quantized levels.
  */
final case class DatasetSpec(
    name: String,
    nU: Long,
    nL: Long,
    targetEdges: Long,
    zU: Double,
    zL: Double,
    weightModel: String, // "uniform" | "ratings" | "rwr" | "allequal"
    seed: Long)

object Datasets {
  /** Paper Table I reference values for side-by-side reporting. */
  final case class PaperRow(nE: String, nU: String, nL: String, delta: Int,
                            alphaMax: Long, betaMax: Long, rDD: String)

  val paperTableI: Map[String, PaperRow] = Map(
    "BS"  -> PaperRow("433K", "77.8K", "186K", 13, 8524, 707, "13.6K"),
    "GH"  -> PaperRow("440K", "56.5K", "121K", 39, 884, 3675, "21.5K"),
    "SO"  -> PaperRow("1.30M", "545K", "96.6K", 22, 4917, 6119, "13.0K"),
    "LS"  -> PaperRow("4.41M", "992", "1.08M", 164, 55559, 773, "177K"),
    "DT"  -> PaperRow("5.74M", "1.62M", "383", 73, 378, 160047, "30.5K"),
    "AR"  -> PaperRow("5.74M", "2.15M", "1.23M", 26, 12180, 3096, "36.6K"),
    "PA"  -> PaperRow("8.65M", "1.43M", "4.00M", 10, 951, 119, "639"),
    "ML"  -> PaperRow("25.0M", "162K", "59.0K", 636, 32202, 81491, "2.12M"),
    "DUI" -> PaperRow("102M", "833K", "33.8M", 183, 24152, 29240, "2.30M"),
    "EN"  -> PaperRow("122M", "3.82M", "21.5M", 254, 1916898, 62330, "1.03M"),
    "DTI" -> PaperRow("137M", "4.51M", "33.8M", 180, 1057753, 6382, "242K"),
  )

  val all: Seq[DatasetSpec] = Seq(
    DatasetSpec("BS", 800, 1900, 4300, 0.8, 0.8, "uniform", 101),
    DatasetSpec("GH", 570, 1200, 4400, 1.0, 0.9, "uniform", 102),
    DatasetSpec("SO", 5400, 970, 13000, 0.9, 1.0, "uniform", 103),
    DatasetSpec("LS", 110, 10800, 15000, 0.5, 1.2, "uniform", 104),
    DatasetSpec("DT", 12000, 80, 20000, 0.9, 0.5, "rwr", 105),
    DatasetSpec("AR", 11000, 6200, 28000, 1.0, 0.9, "uniform", 106),
    DatasetSpec("PA", 7000, 20000, 43000, 0.6, 0.6, "rwr", 107),
    DatasetSpec("ML", 1600, 590, 42000, 0.7, 0.7, "ratings", 108),
    DatasetSpec("DUI", 4100, 16500, 48000, 1.0, 1.0, "uniform", 109),
    DatasetSpec("EN", 8000, 12000, 52000, 1.1, 1.0, "uniform", 110),
    DatasetSpec("DTI", 9200, 17000, 56000, 1.0, 0.9, "uniform", 111),
  )

  def byName(name: String): DatasetSpec = all.find(_.name == name).get

  /** The four smallest datasets — used by the query-time / index / SCS
    * benches where every extra dataset multiplies wall-clock cost.
    */
  def small: Seq[DatasetSpec] = Seq(byName("BS"), byName("GH"), byName("SO"), byName("LS"))

  /** Default number of distinct weight levels (DESIGN.md §4). */
  val WeightLevels = 16

  def generate(spark: SparkSession, spec: DatasetSpec): DataFrame = {
    val raw = SynthData.bipartite(spark, spec.nU, spec.nL, spec.targetEdges,
      spec.zU, spec.zL, spec.seed)
    val weighted = spec.weightModel match {
      case "ratings"  => Weights.ratings(raw, spec.seed + 1)
      case "rwr"      => Weights.rwr(raw, WeightLevels)
      case "allequal" => Weights.allEqual(raw)
      case _          => Weights.uniform(raw, WeightLevels, spec.seed + 1)
    }
    Bipartite.cp(weighted)
  }
}
