package repro.gnn

/** One GNN workload configuration (paper Table 3 + §5.1).
  *
  * @param model       GraphSage, GCN, or GAT (DistGNN supports GraphSage only)
  * @param featureSize input feature dimension f
  * @param hidden      hidden dimension h
  * @param layers      number of GNN layers L
  */
final case class GnnParams(
    model: String = "GraphSage",
    featureSize: Int = 64,
    hidden: Int = 64,
    layers: Int = 3,
) {
  require(Seq("GraphSage", "GCN", "GAT").contains(model), s"unknown model $model")

  /** Input dimension of layer l (1-based): features for the first layer,
    * hidden for the rest.
    */
  def dimIn(l: Int): Int = if (l == 1) featureSize else hidden

  /** Neighborhood-sampling fanouts, outermost hop first (paper §5.1):
    * 2 layers → (25, 20); 3 → (15, 10, 5); 4 → (10, 10, 5, 5).
    * `fanouts(t-1)` is the fanout of hop t away from the batch roots.
    */
  def fanouts: Seq[Int] = layers match {
    case 2 => Seq(25, 20)
    case 3 => Seq(15, 10, 5)
    case 4 => Seq(10, 10, 5, 5)
    case l => Seq.fill(l)(10)
  }

  /** Trainable parameter count (weight matrices of each layer; GAT adds
    * attention vectors, GraphSage concatenates self+neighbor).
    */
  def modelParams: Long = {
    val base = (1 to layers).map(l => dimIn(l).toLong * hidden).sum
    model match {
      case "GraphSage" => 2 * base // self + neighbor weight matrices
      case "GCN" => base
      case "GAT" => base + (1 to layers).map(_ => 2L * hidden).sum
    }
  }

  /** Relative compute cost multiplier of the model architecture. */
  def computeMult: Double = model match {
    case "GraphSage" => 1.0
    case "GCN" => 0.9
    case "GAT" => 1.6 // attention scores + softmax per edge
  }
}

object GnnConfig {

  /** The full hyper-parameter grid of Table 3 (27 combinations). */
  def grid(model: String = "GraphSage"): Seq[GnnParams] =
    for {
      f <- Seq(16, 64, 512)
      h <- Seq(16, 64, 512)
      l <- Seq(2, 3, 4)
    } yield GnnParams(model, f, h, l)

  /** Default configuration used by the detailed phase analyses. */
  val default: GnnParams = GnnParams()
}
