package repro.baseline

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.data.NestedTpch
import repro.data.NestedTpch._

/** The SparkSQL competitor of §6: hand-written Spark SQL honoring the
  * restriction that nested input must be fully flattened (`LATERAL VIEW
  * OUTER posexplode`) before any join — no explode in SELECT, no join inside
  * an exploding block. Nested outputs are rebuilt bottom-up with
  * `collect_list(named_struct(…))` keyed on positional ids, exactly the shape
  * a SparkSQL user is forced into.
  *
  * Depth model for a level-L query: depth 0 is the top tuple (attrs `A_0`,
  * id `mid`), depths 1..L-1 are exploded dimension tuples, depth L the
  * exploded bottom (`l_partkey`, `l_quantity`). In the flattened view the
  * depth-d columns are prefixed `e<d>__` with position column `e<d>_pos`.
  */
object SparkSQLBaseline {

  private var viewCtr = 0
  private def freshView(p: String): String = { viewCtr += 1; s"${p}_$viewCtr" }

  private def attrsOf(l: NestedTpch.Level, wide: Boolean): Seq[String] =
    outAttrs(l, wide).map(_._1)

  /** Attributes of the depth-d tuples (d = 0..L-1 dims; d = L bottom). */
  private def depthAttrs(level: Int, wide: Boolean, d: Int): Seq[String] =
    if (d == level) Seq("l_partkey", "l_quantity")
    else attrsOf(levels(wide)(level - 1 - d), wide)

  /** Bag attribute stored inside depth-d tuples (d = 0..L-1). */
  private def bagAt(level: Int, d: Int): String = BagNames(level - 1 - d)

  // --------------------------------------------------------- flat-to-nested

  /** B.1 baseline: grouped subqueries with LEFT JOINs, bottom-up. */
  def flatToNested(spark: SparkSession, t: Tables, level: Int, wide: Boolean): DataFrame = {
    t.lineitem.createOrReplaceTempView("sql_lineitem")
    t.orders.createOrReplaceTempView("sql_orders")
    t.customer.createOrReplaceTempView("sql_customer")
    t.nation.createOrReplaceTempView("sql_nation")
    t.region.createOrReplaceTempView("sql_region")
    if (level == 0)
      return spark.sql("SELECT l_partkey, l_quantity FROM sql_lineitem")

    var curView = "sql_lineitem"
    var curAttrs = Seq("l_partkey", "l_quantity")
    var curKey = "l_orderkey"
    for (i <- 0 until level) {
      val l = levels(wide)(i)
      val dim = Map("Orders" -> "sql_orders", "Customer" -> "sql_customer",
        "Nation" -> "sql_nation", "Region" -> "sql_region")(l.table)
      val bag = BagNames(i)
      val attrs = attrsOf(l, wide)
      val grouped = freshView("g")
      spark.sql(
        s"""SELECT $curKey AS __k,
           |       collect_list(named_struct(${curAttrs.map(a => s"'$a', $a").mkString(", ")})) AS $bag
           |FROM $curView GROUP BY $curKey""".stripMargin)
        .createOrReplaceTempView(grouped)
      val carry = l.upKey.filterNot(attrs.contains).toSeq
      val next = freshView("lvl")
      spark.sql(
        s"""SELECT ${(carry ++ attrs).distinct.map(a => s"d.$a").mkString(", ")},
           |       CASE WHEN g.__k IS NULL THEN array() ELSE g.$bag END AS $bag
           |FROM $dim d LEFT OUTER JOIN $grouped g ON d.${l.selfKey} = g.__k""".stripMargin)
        .createOrReplaceTempView(next)
      curView = next
      curAttrs = attrs :+ bag
      curKey = l.upKey.orNull
    }
    spark.sql(s"SELECT ${curAttrs.mkString(", ")} FROM $curView")
  }

  // ----------------------------------------------------------- flattening

  /** Fully flatten the nested input; returns the flat view name. */
  private def flattenView(spark: SparkSession, nested: DataFrame, level: Int,
                          wide: Boolean): String = {
    val base = freshView("v")
    nested.createOrReplaceTempView(base)
    val topAttrs = depthAttrs(level, wide, 0)
    val picked = Seq.newBuilder[String]
    picked ++= topAttrs.map(a => s"t.$a AS $a")
    val laterals = new StringBuilder
    var bag = s"t.${bagAt(level, 0)}"
    for (d <- 1 to level) {
      laterals ++= s"\nLATERAL VIEW OUTER posexplode($bag) lv$d AS e${d}_pos, e$d"
      picked += s"e${d}_pos"
      picked ++= depthAttrs(level, wide, d).map(a => s"e$d.$a AS e${d}__$a")
      if (d < level) bag = s"e$d.${bagAt(level, d)}"
    }
    val flat = freshView("flat")
    spark.sql(
      s"""SELECT mid, ${picked.result().mkString(", ")}
         |FROM (SELECT monotonically_increasing_id() AS mid, * FROM $base) t ${laterals.result()}
         |""".stripMargin).createOrReplaceTempView(flat)
    flat
  }

  // --------------------------------------------------------- nested-to-flat

  /** B.3 baseline: flatten, join Part, aggregate at the top. */
  def nestedToFlat(spark: SparkSession, nested: DataFrame, part: DataFrame,
                   level: Int, wide: Boolean): DataFrame = {
    part.createOrReplaceTempView("sql_part")
    if (level == 0) {
      nested.createOrReplaceTempView("sql_li0")
      return spark.sql(
        """SELECT p.p_name AS p_name, sum(l.l_quantity * p.p_retailprice) AS total
          |FROM sql_li0 l JOIN sql_part p ON l.l_partkey = p.p_partkey
          |GROUP BY p.p_name""".stripMargin)
    }
    val flat = flattenView(spark, nested, level, wide)
    val keys = depthAttrs(level, wide, 0)
    spark.sql(
      s"""SELECT ${keys.map(k => s"f.$k AS $k").mkString(", ")},
         |       sum(f.e${level}__l_quantity * p.p_retailprice) AS total
         |FROM $flat f JOIN sql_part p ON f.e${level}__l_partkey = p.p_partkey
         |GROUP BY ${keys.map(k => s"f.$k").mkString(", ")}""".stripMargin)
  }

  // ------------------------------------------------------- nested-to-nested

  /** B.2 baseline: flatten, left-join Part, aggregate at the bottom, regroup
    * every level with `collect_list` keyed on the positional ids.
    */
  def nestedToNested(spark: SparkSession, nested: DataFrame, part: DataFrame,
                     level: Int, wide: Boolean): DataFrame = {
    part.createOrReplaceTempView("sql_part")
    if (level == 0) return nestedToFlat(spark, nested, part, 0, wide)
    val flat = flattenView(spark, nested, level, wide)

    /** Grouping columns identifying depth-d tuples: ids and attrs above and
      * including depth d.
      */
    def idsAndAttrs(d: Int): Seq[String] =
      Seq("mid") ++ depthAttrs(level, wide, 0) ++
        (1 to d).flatMap(k => s"e${k}_pos" +: depthAttrs(level, wide, k).map(a => s"e${k}__$a"))

    // Bottom aggregate (sumBy p_name within each depth L-1 tuple).
    val aggGroup = idsAndAttrs(level - 1).mkString(", ")
    val agg = freshView("agg")
    spark.sql(
      s"""SELECT $aggGroup, p.p_name AS p_name,
         |       sum(CASE WHEN p.p_name IS NOT NULL
         |                THEN f.e${level}__l_quantity * p.p_retailprice END) AS total
         |FROM $flat f LEFT OUTER JOIN sql_part p ON f.e${level}__l_partkey = p.p_partkey
         |GROUP BY $aggGroup, p.p_name""".stripMargin).createOrReplaceTempView(agg)

    // Regroup bottom-up: depth d collects its child bag.
    var cur = agg
    var childStruct = "CASE WHEN p_name IS NOT NULL THEN named_struct('p_name', p_name, 'total', total) END"
    for (d <- (level - 1) to 0 by -1) {
      val bagName = bagAt(level, d)
      val group = idsAndAttrs(d)
      val next = freshView("grp")
      // Child tuples at depth d+1 exist iff their position id is non-null.
      val childAttrs =
        if (d + 1 <= level - 1) depthAttrs(level, wide, d + 1).map(a => s"'$a', e${d + 1}__$a")
        else Seq.empty
      val wrapped =
        if (d == level - 1) childStruct
        else s"CASE WHEN e${d + 1}_pos IS NOT NULL THEN " +
             s"named_struct(${(childAttrs :+ s"'${bagAt(level, d + 1)}', ${bagAt(level, d + 1)}").mkString(", ")}) END"
      spark.sql(
        s"""SELECT ${group.mkString(", ")}, collect_list($wrapped) AS $bagName
           |FROM $cur GROUP BY ${group.mkString(", ")}""".stripMargin)
        .createOrReplaceTempView(next)
      cur = next
    }
    val topAttrs = depthAttrs(level, wide, 0)
    spark.sql(s"SELECT ${(topAttrs :+ bagAt(level, 0)).mkString(", ")} FROM $cur")
  }

  // ------------------------------------------------------------ biomedical

  /** Fig. 9 baseline, Step₁: flatten Occurrences, join, aggregate, regroup. */
  def bioStep1(spark: SparkSession, cat: Map[String, DataFrame]): DataFrame = {
    cat("Samples").createOrReplaceTempView("sql_samples")
    cat("Occurrences").createOrReplaceTempView("sql_occ")
    cat("CopyNumber").createOrReplaceTempView("sql_cn")
    cat("SOImpact").createOrReplaceTempView("sql_so")
    spark.sql(
      """SELECT sample, contig, start, mutationId,
        |       t.gene AS gene, t.impact AS impact, t.sift AS sift, t.poly AS poly,
        |       c.conseq AS conseq
        |FROM sql_occ
        |LATERAL VIEW OUTER explode(candidates) lv1 AS t
        |LATERAL VIEW OUTER explode(t.consequences) lv2 AS c
        |""".stripMargin).createOrReplaceTempView("sql_occ_flat")
    spark.sql(
      """SELECT s.sample, s.aliquot, o.gene AS gene,
        |       sum((CASE o.impact WHEN 'HIGH' THEN 0.8 WHEN 'MODERATE' THEN 0.5
        |                          WHEN 'LOW' THEN 0.3 WHEN 'MODIFIER' THEN 0.15
        |                          ELSE 0.01 END)
        |           * v.value * (n.cnum + 0.01) * o.sift * o.poly) AS score
        |FROM sql_samples s
        |JOIN sql_occ_flat o ON o.sample = s.sample
        |JOIN sql_cn n       ON n.aliquot = s.aliquot AND n.gene = o.gene
        |JOIN sql_so v       ON v.conseq = o.conseq
        |GROUP BY s.sample, s.aliquot, o.gene
        |""".stripMargin).createOrReplaceTempView("sql_hscores")
    spark.sql(
      """SELECT s.sample, s.aliquot,
        |       collect_list(CASE WHEN h.gene IS NOT NULL
        |                         THEN named_struct('gene', h.gene, 'score', h.score) END) AS scores
        |FROM sql_samples s
        |LEFT OUTER JOIN sql_hscores h ON h.sample = s.sample AND h.aliquot = s.aliquot
        |GROUP BY s.sample, s.aliquot""".stripMargin)
  }

  /** Fig. 9 baseline, Step₂: flatten hybrid scores and the network. */
  def bioStep2(spark: SparkSession, cat: Map[String, DataFrame], hybrid: DataFrame): DataFrame = {
    hybrid.createOrReplaceTempView("sql_hm")
    cat("Network").createOrReplaceTempView("sql_net")
    cat("Biomart").createOrReplaceTempView("sql_biomart")
    spark.sql(
      """SELECT nodeProtein, e.edgeProtein AS edgeProtein, e.distance AS distance
        |FROM sql_net LATERAL VIEW OUTER explode(edges) lv AS e
        |""".stripMargin).createOrReplaceTempView("sql_net_flat")
    spark.sql(
      """SELECT sample, aliquot, y.gene AS gene, y.score AS score
        |FROM sql_hm LATERAL VIEW OUTER explode(scores) lv AS y
        |""".stripMargin).createOrReplaceTempView("sql_hm_flat")
    spark.sql(
      """SELECT h.sample, h.aliquot, n.nodeProtein AS node,
        |       sum(n.distance * h.score) AS score
        |FROM sql_hm_flat h
        |JOIN sql_biomart b  ON h.gene = b.gene
        |JOIN sql_net_flat n ON n.edgeProtein = b.protein
        |GROUP BY h.sample, h.aliquot, n.nodeProtein
        |""".stripMargin).createOrReplaceTempView("sql_nscores")
    spark.sql(
      """SELECT h.sample, h.aliquot,
        |       collect_list(CASE WHEN n.node IS NOT NULL
        |                         THEN named_struct('node', n.node, 'score', n.score) END) AS nodes
        |FROM (SELECT DISTINCT sample, aliquot FROM sql_hm) h
        |LEFT OUTER JOIN sql_nscores n ON n.sample = h.sample AND n.aliquot = h.aliquot
        |GROUP BY h.sample, h.aliquot""".stripMargin)
  }
}
