package repro.bench

/** Table 5: engineering effort as lines of source code per relational
  * operator. Our numbers are counted from this repo (cloc-style: non-blank,
  * non-comment); baseline numbers are quoted from the paper (their systems
  * are not in this container).
  */
object Table5Runner {

  final case class Row(system: String, hashJoin: Option[Int], sortJoin: Option[Int], aggregation: Option[Int])

  /** cloc-equivalent count: strips blank lines, // and /*…*/ comments. */
  def countLoc(path: java.nio.file.Path): Int = {
    val src = new String(java.nio.file.Files.readAllBytes(path), "UTF-8")
    var inBlock = false
    src.linesIterator.count { line0 =>
      val line = line0.trim
      if (inBlock) {
        if (line.contains("*/")) inBlock = false
        false
      } else if (line.startsWith("/*") || line.startsWith("/**")) {
        if (!line.contains("*/")) inBlock = true
        false
      } else line.nonEmpty && !line.startsWith("//") && !line.startsWith("*")
    }
  }

  /** Locate the repo root from a forked test JVM (whose cwd may be a
    * subproject directory) by walking upwards until the source tree shows.
    */
  def findRepoRoot(): java.nio.file.Path = {
    var p = java.nio.file.Paths.get(".").toAbsolutePath.normalize
    while (p != null && !java.nio.file.Files.isDirectory(p.resolve("src/main/scala/repro/core/ops")))
      p = p.getParent
    require(p != null, "cannot locate repo root")
    p
  }

  def run(repoRoot: java.nio.file.Path = findRepoRoot()): Seq[Row] = {
    val ops = repoRoot.resolve("src/main/scala/repro/core/ops")
    def loc(f: String): Int = countLoc(ops.resolve(f))
    Seq(
      Row("TQP-repro (various HW)", Some(loc("HashJoin.scala")), Some(loc("SortJoin.scala")),
          Some(loc("AggregateOp.scala"))),
      // Paper Table 5 values:
      Row("TQP (paper)",      Some(148),  Some(182),  Some(104)),
      Row("Spark (CPU)",      Some(706),  Some(1439), Some(637)),
      Row("DuckDB (CPU)",     Some(1415), Some(877),  Some(1466)),
      Row("BlazingSQL (GPU)", Some(1628), None,       Some(1389)),
      Row("OmnisciDB (GPU)",  Some(10141), None,      Some(2416)),
    )
  }

  def print(rows: Seq[Row]): Unit =
    Measure.printTable("Table 5: lines of source code per operator",
      Seq("System", "Hash Join", "Sort-Based Join", "Aggregation"),
      rows.map(r => Seq(r.system,
        r.hashJoin.map(_.toString).getOrElse("N/A"),
        r.sortJoin.map(_.toString).getOrElse("N/A"),
        r.aggregation.map(_.toString).getOrElse("N/A"))))
}
