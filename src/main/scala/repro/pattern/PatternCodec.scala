package repro.pattern

/** Compact, parseable string codec for patterns. Used by the baselines to
  * ship canonical pattern keys through DataFrame columns and reconstruct
  * the `Pattern` on the driver.
  */
object PatternCodec {

  def encode(p: Pattern): String = {
    val vs = p.vertices.mkString(",")
    val es = p.edges.toSeq.sorted.map { case (u, v) => s"$u-$v" }.mkString(",")
    val as = p.antiEdges.toSeq.sorted.map { case (u, v) => s"$u-$v" }.mkString(",")
    val ls = p.labels.toSeq.sorted.map { case (u, l) => s"$u:$l" }.mkString(",")
    s"$vs|$es|$as|$ls"
  }

  def decode(s: String): Pattern = {
    val parts = s.split("\\|", -1)
    require(parts.length == 4, s"bad pattern encoding: $s")
    def pairs(x: String): Set[(Int, Int)] =
      if (x.isEmpty) Set.empty
      else x.split(",").map { e => val Array(u, v) = e.split("-"); (u.toInt, v.toInt) }.toSet
    val vs = if (parts(0).isEmpty) Vector.empty[Int] else parts(0).split(",").map(_.toInt).toVector
    val ls =
      if (parts(3).isEmpty) Map.empty[Int, Int]
      else parts(3).split(",").map { e => val Array(u, l) = e.split(":"); u.toInt -> l.toInt }.toMap
    Pattern(vs, pairs(parts(1)), pairs(parts(2)), ls)
  }
}
