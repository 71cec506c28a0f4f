package repro.data

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types._
import scala.util.Random

/** One generated entity profile: values aligned with the spec's
  * attribute list; nulls mark missing values.
  */
final case class Profile(id: Int, values: IndexedSeq[String]) {

  /** Schema-agnostic text: all non-null attribute values joined. */
  def allText: String = values.iterator.filter(_ != null).mkString(" ")
}

/** A generated CCER dataset: two clean collections plus ground truth. */
final case class CcerDataset(
    spec: DatasetSpec,
    profiles1: IndexedSeq[Profile],
    profiles2: IndexedSeq[Profile],
    groundTruth: Seq[(Int, Int)],
) {
  private def attrIdx(attr: String): Int = {
    val i = spec.attrs.indexWhere(_.name == attr)
    require(i >= 0, s"unknown attribute $attr in ${spec.id}")
    i
  }

  /** Attribute value of a profile (null if missing). */
  def value(p: Profile, attr: String): String = p.values(attrIdx(attr))

  /** Name-value-pair count of a collection (paper Table 2's |NVP|). */
  def nvp(side: Int): Int = {
    val ps = if (side == 1) profiles1 else profiles2
    ps.iterator.map(_.values.count(_ != null)).sum
  }

  /** Average name-value pairs per profile (paper Table 2's |p̄|). */
  def avgPairs(side: Int): Double =
    nvp(side).toDouble / (if (side == 1) profiles1.length else profiles2.length)

  /** The collection as a Spark DataFrame (id + one column per attribute). */
  def toDF(spark: SparkSession, side: Int): DataFrame = {
    val ps = if (side == 1) profiles1 else profiles2
    val schema = StructType(
      StructField("id", IntegerType, nullable = false) +:
        spec.attrs.map(a => StructField(a.name, StringType, nullable = true))
    )
    val rows = ps.map(p => Row.fromSeq(p.id +: p.values))
    spark.createDataFrame(spark.sparkContext.parallelize(rows, 8), schema)
  }

  /** Ground truth as a DataFrame (id1, id2). */
  def gtDF(spark: SparkSession): DataFrame = {
    val schema = StructType(Seq(
      StructField("id1", IntegerType, nullable = false),
      StructField("id2", IntegerType, nullable = false),
    ))
    val rows = groundTruth.map { case (i, j) => Row(i, j) }
    spark.createDataFrame(spark.sparkContext.parallelize(rows, 4), schema)
  }
}

/** Deterministic synthetic CCER dataset generator (see DESIGN.md —
  * substitution for the paper's ten real datasets).
  *
  * Both collections render profiles of shared "world entities": the
  * overlap of the two world-id ranges forms the ground-truth duplicates.
  * Each profile applies independent, side-specific noise to the world
  * entity's canonical attribute values, so duplicates are similar but
  * not identical, and non-duplicates share vocabulary in proportion to
  * the spec's pool size.
  */
object CcerGenerator {

  private val categories = IndexedSeq(
    "alpha", "bravo", "delta", "sigma", "omega", "metro", "nova", "zenith")

  /** Zipf-flavoured word draw: half the draws concentrate on the head of
    * the pool (shared, stop-word-like tokens that make non-duplicates
    * confusable), half are uniform (distinctive tokens that make
    * duplicates findable). Real attribute text has exactly this mix.
    */
  private def pickWord(pool: IndexedSeq[String], rnd: Random): String =
    if (rnd.nextBoolean()) {
      val idx = (pool.length * math.pow(rnd.nextDouble(), 3.0)).toInt
      pool(math.min(idx, pool.length - 1))
    } else pool(rnd.nextInt(pool.length))

  /** Generate the dataset for a spec (optionally size-scaled). */
  def generate(spec0: DatasetSpec, scale: Double = 1.0): CcerDataset = {
    val spec = if (scale == 1.0) spec0 else DatasetSpec.scaled(spec0, scale)
    val words = Vocab.pool(spec.vocabSize, spec.seed)
    val firstNames = Vocab.pool(120, spec.seed + 1).map(_.capitalize)
    val lastNames = Vocab.pool(200, spec.seed + 2).map(_.capitalize)

    val worldCount = spec.n1 + spec.n2 - spec.dups
    val overlapStart = spec.n1 - spec.dups

    def canonical(world: Int): IndexedSeq[String] = {
      val rnd = new Random(spec.seed * 1000003L + world * 7919L)
      spec.attrs.toIndexedSeq.map { a =>
        a.kind match {
          case WordsAttr =>
            val len = a.words._1 + rnd.nextInt(a.words._2 - a.words._1 + 1)
            Seq.fill(len)(pickWord(words, rnd)).mkString(" ")
          case PersonsAttr =>
            val k = a.words._1 + rnd.nextInt(a.words._2 - a.words._1 + 1)
            Seq.fill(k)(
              firstNames(rnd.nextInt(firstNames.length)) + " " +
                lastNames(rnd.nextInt(lastNames.length))
            ).mkString(", ")
          case PhoneAttr    => Vocab.phone(rnd)
          case ModelNoAttr  => Vocab.modelNo(rnd)
          case YearAttr     => (1950 + rnd.nextInt(70)).toString
          case PriceAttr    => f"${5 + rnd.nextInt(995)}%d.${rnd.nextInt(100)}%02d"
          case CategoryAttr => categories(rnd.nextInt(categories.length))
        }
      }
    }

    def render(world: Int, side: Int): IndexedSeq[String] = {
      val canon = canonical(world)
      val rnd = new Random(spec.seed ^ (side * 5779L) ^ (world * 104729L))
      val n = spec.noise
      var vals: IndexedSeq[String] = spec.attrs.zipWithIndex.map { case (a, k) =>
        val missRate = if (side == 1) a.missRate1 else a.missRate2
        if (rnd.nextDouble() < missRate) null
        else a.kind match {
          case WordsAttr =>
            Vocab.perturb(canon(k), rnd, n.typoRate, n.dropRate, n.extraRate, words)
          case PersonsAttr =>
            // Person lists lose whole names rather than single tokens.
            val persons = canon(k).split(", ").toBuffer
            if (persons.length > 1 && rnd.nextDouble() < n.dropRate) persons.remove(persons.length - 1)
            persons.map(p => if (rnd.nextDouble() < n.typoRate) Vocab.typo(p, rnd) else p)
              .mkString(", ")
          case PhoneAttr | ModelNoAttr =>
            if (rnd.nextDouble() < n.typoRate) Vocab.digitNoise(canon(k), 1, rnd) else canon(k)
          case YearAttr =>
            if (rnd.nextDouble() < n.typoRate)
              (canon(k).toInt + (if (rnd.nextBoolean()) 1 else -1)).toString
            else canon(k)
          case PriceAttr =>
            if (rnd.nextDouble() < n.typoRate * 2)
              f"${(canon(k).toDouble * (0.9 + rnd.nextDouble() * 0.2))}%.2f"
            else canon(k)
          case CategoryAttr =>
            if (rnd.nextDouble() < n.typoRate) categories(rnd.nextInt(categories.length))
            else canon(k)
        }
      }.toIndexedSeq
      // Misplaced values: fold a later word/person attribute into the
      // first word attribute and blank the source (paper's D4/D9 noise).
      if (n.misplaceRate > 0 && rnd.nextDouble() < n.misplaceRate) {
        val firstWordsIdx = spec.attrs.indexWhere(_.kind == WordsAttr)
        val srcIdx = spec.attrs.indexWhere(a => a.kind == PersonsAttr || a.kind == WordsAttr,
          from = firstWordsIdx + 1)
        if (firstWordsIdx >= 0 && srcIdx > firstWordsIdx &&
            vals(firstWordsIdx) != null && vals(srcIdx) != null) {
          vals = vals
            .updated(firstWordsIdx, vals(firstWordsIdx) + " " + vals(srcIdx))
            .updated(srcIdx, null)
        }
      }
      vals
    }

    // V2 profiles are shuffled so duplicate pairs carry unrelated ids —
    // real datasets are not aligned, and an aligned layout would hand
    // BAH's i-to-i initial assignment the exact solution for free.
    val worldOfV2 = new Random(spec.seed + 9090L).shuffle((0 until spec.n2).toVector)
    val profiles1 = (0 until spec.n1).map(i => Profile(i, render(i, side = 1)))
    val profiles2 = (0 until spec.n2).map(j => Profile(j, render(overlapStart + worldOfV2(j), side = 2)))
    val v2IdOfWorldOffset = worldOfV2.zipWithIndex.toMap
    val gt = (overlapStart until spec.n1).map(w => (w, v2IdOfWorldOffset(w - overlapStart)))
    CcerDataset(spec, profiles1, profiles2, gt)
  }
}
