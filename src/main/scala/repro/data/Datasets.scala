package repro.data

import org.apache.spark.sql.SparkSession
import repro.graph.LabeledGraph

/** The four evaluation datasets of Table IV, as synthetic stand-ins that
  * preserve the experiments' controlled variable — average vertex degree
  * per label `|E| / (|V|·|Σ|)` — and (for the three small graphs) the
  * alphabet size. Yago2s and Advogato are scaled down for local Spark;
  * DESIGN.md §3 documents each substitution.
  *
  * @param paperV/paperE  sizes reported in Table IV (for EXPERIMENTS.md)
  */
final case class DatasetSpec(name: String, numV: Long, numE: Long, numLabels: Int,
                             paperV: Long, paperE: Long, seed: Long) {
  /** Average vertex degree per label of the generated graph (target). */
  def degreePerLabel: Double = numE.toDouble / (numV.toDouble * numLabels)
  /** Average vertex degree per label reported in the paper. */
  def paperDegree: Double = paperE.toDouble / (paperV.toDouble * numLabels)

  def load(spark: SparkSession): LabeledGraph =
    GraphGen.random(spark, numV, numE, numLabels, seed).materialize
}

object Datasets {
  /** Yago2s stand-in: 245M edges is not a local-Spark target; degree 0.02
    * and |Σ| = 104 preserved — per-label subgraphs are near-forests, SCCs
    * almost all trivial, reproducing the paper's exceptional regime.
    */
  val Yago2s: DatasetSpec =
    DatasetSpec("Yago2s", 20000, 41600, 104, 108048761L, 244796155L, seed = 11)

  /** Robots at full published size (degree 0.52). */
  val Robots: DatasetSpec =
    DatasetSpec("Robots", 1725, 3596, 4, 1725, 3596, seed = 12)

  /** Advogato scaled 1/8 in |V|, degree 2.61 preserved (full-size TC(G_R)
    * is minutes-per-R under local Spark and the NoSharing baseline's
    * product-graph BFS scales ~|V|²; the Full/RTC ratio is degree-driven).
    */
  val Advogato: DatasetSpec =
    DatasetSpec("Advogato", 818, 6403, 3, 6541, 51127, seed = 13)

  /** Youtube_Sampled scaled 1/2 in |V|, degree 11.42 preserved; the
    * paper's version is itself a random vertex sample with random edge
    * directions, so ours plays the same role at half the sample size.
    */
  val Youtube: DatasetSpec =
    DatasetSpec("Youtube", 800, 45672, 5, 1600, 91343, seed = 14)

  /** All four, in Table IV's (ascending degree) order. */
  val all: Seq[DatasetSpec] = Seq(Yago2s, Robots, Advogato, Youtube)
}
