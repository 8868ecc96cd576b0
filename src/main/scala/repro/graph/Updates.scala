package repro.graph

/** A directed weighted edge. Bias is Double so the same model covers the
  * paper's integer (degree-based) and floating-point bias experiments; in
  * integer mode the value is a whole number.
  */
final case class Edge(src: Int, dst: Int, bias: Double)

/** One dynamic-graph event (paper §2.1). `ts` is the global sequence number
  * used for the duplicate-edge "delete the earlier version first" rule.
  */
final case class Update(ts: Long, insert: Boolean, src: Int, dst: Int, bias: Double)

/** Update situations of the paper's evaluation (§6.1 *Dynamic updates*). */
sealed abstract class UpdateMode(val label: String) extends Serializable
object UpdateMode {
  case object Insertion extends UpdateMode("Insertion")
  case object Deletion extends UpdateMode("Deletion")
  case object Mixed extends UpdateMode("Mixed")
  val All: Seq[UpdateMode] = Seq(Insertion, Deletion, Mixed)
}
