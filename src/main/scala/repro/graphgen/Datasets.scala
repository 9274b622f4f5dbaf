package repro.graphgen

import repro.core.Edge

/** Synthetic stand-ins for the paper's Table I datasets.
  *
  * Each category keeps a (train, test) graph pair built by the generator
  * family that matches the category's structure (see DESIGN.md §3), with
  * different seeds and sizes so WSD-L's train-on-one / test-on-another
  * protocol is preserved. Sizes are set by the caller (`targetEdges`);
  * generation over-produces and truncates to the natural-order prefix.
  */
object Datasets {

  /** Paper categories; `synthetic` is the FF G(n, p = 0.5) dataset. */
  val categories: Seq[String] = Seq("cit", "com", "soc", "web", "synthetic")

  /** Test-graph names as printed in the paper's tables. */
  def testName(category: String): String = category match {
    case "cit" => "cit-PT"; case "com" => "com-YT"; case "soc" => "soc-TW"
    case "web" => "web-GL"; case "synthetic" => "synthetic"
    case c => throw new IllegalArgumentException(s"unknown category $c")
  }

  /** Train-graph names as printed in the paper's tables. */
  def trainName(category: String): String = category match {
    case "cit" => "cit-HE"; case "com" => "com-DB"; case "soc" => "soc-TX"
    case "web" => "web-SF"; case "synthetic" => "synthetic"
    case c => throw new IllegalArgumentException(s"unknown category $c")
  }

  /** Test graph for a category, ~`targetEdges` edges, deterministic. */
  def test(category: String, targetEdges: Int, seed: Long = 7001): Array[Long] =
    generate(category, targetEdges, seed)

  /** Train graph for a category — same family, different seed. */
  def train(category: String, targetEdges: Int, seed: Long = 3001): Array[Long] =
    generate(category, targetEdges, seed + 104729)

  private def generate(category: String, targetEdges: Int, seed: Long): Array[Long] = {
    require(targetEdges >= 16, s"targetEdges too small: $targetEdges")
    // Densities are calibrated so the triangle signal per edge (p²·T_e at
    // the bench sampling ratio) is non-vanishing — the regime in which the
    // paper's |H|-based weighting carries information (see EXPERIMENTS.md,
    // scale calibration).
    val edges = category match {
      case "cit" =>
        // citation: Forest Fire, moderate burn width
        Generators.forestFire(n = math.max(8, targetEdges / 18), p = 0.42, seed = seed, burnCap = 20)
      case "com" =>
        // community: planted partition with dense communities,
        // ~92% intra-community edges
        val commSize = 30
        val perComm  = (commSize * (commSize - 1) / 2 * 0.5).toInt // ≈ 217
        val k        = math.max(2, (targetEdges * 0.92 / perComm).toInt)
        Generators.plantedPartition(k, commSize, pIn = 0.5,
          interEdges = math.max(1, (targetEdges * 0.08).toInt), seed = seed)
      case "soc" =>
        // social: Barabási–Albert, heavy-tailed hubs
        val m = 20
        Generators.barabasiAlbert(n = math.max(m + 2, targetEdges / m), m = m, seed = seed)
      case "web" =>
        // web: Forest Fire with high burn probability (dense clustering)
        Generators.forestFire(n = math.max(8, targetEdges / 25), p = 0.5, seed = seed, burnCap = 28)
      case "synthetic" =>
        // the paper's own synthetic setting: FF G(n, p = 0.5)
        Generators.forestFire(n = math.max(8, targetEdges / 30), p = 0.5, seed = seed, burnCap = 30)
      case c => throw new IllegalArgumentException(s"unknown category $c")
    }
    if (edges.length > targetEdges) edges.take(targetEdges) else edges
  }

  /** Basic statistics used by the Table I reproduction. */
  def stats(edges: Array[Long]): (Int, Int) = {
    val vs = scala.collection.mutable.HashSet.empty[Int]
    edges.foreach { k => vs += Edge.u(k); vs += Edge.v(k) }
    (vs.size, edges.length)
  }
}
