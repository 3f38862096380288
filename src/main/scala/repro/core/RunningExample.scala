package repro.core

import repro.graph._

/** The paper's running example (Figure 2): vertices a..e, weighted edges,
  * SPSP/SSSP from a, and two updates:
  *  - G1: edge (a, d) weight 20 → 100
  *  - G2: edge (b, c) weight 10 → 100
  */
object RunningExample {
  val A = 0; val B = 1; val C = 2; val D = 3; val E = 4

  val initialEdges: Seq[(Int, Int, Int, Byte)] = Seq(
    (A, B, 30, 0.toByte), (B, C, 10, 0.toByte), (C, D, 10, 0.toByte),
    (A, D, 20, 0.toByte), (D, E, 10, 0.toByte), (A, E, 10, 0.toByte),
    (D, C, 20, 0.toByte),
  )

  val update1: Seq[EdgeUpdate] = Seq(
    EdgeUpdate(A, D, 20, 0, add = false), EdgeUpdate(A, D, 100, 0, add = true))

  val update2: Seq[EdgeUpdate] = Seq(
    EdgeUpdate(B, C, 10, 0, add = false), EdgeUpdate(B, C, 100, 0, add = true))

  def graph(): DynamicGraph = DynamicGraph.fromEdges(5, initialEdges)
}
