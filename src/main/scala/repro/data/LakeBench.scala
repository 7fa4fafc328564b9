package repro.data

import scala.util.Random

import org.apache.spark.sql.{DataFrame, SparkSession}

import repro.core.profile.DataProfiler
import repro.substrate.text.{Ner, WordEmbedding}

/** One table of a synthetic data lake (driver-side representation; the
  * systems under test consume either this or the Spark cells view).
  */
case class LakeTable(dataset: String, name: String, columns: Seq[String],
                     rows: Seq[Seq[String]]) {
  def rowCount: Int = rows.size
  def sizeBytes: Long =
    columns.map(_.length + 1).sum.toLong +
      rows.iterator.map(_.iterator.map(v => if (v == null) 1 else v.length + 1).sum.toLong).sum
}

/** A synthetic data-lake benchmark with partition-derived ground truth:
  * tables from the same `family` are unionable (the construction of TUS
  * Small / SANTOS Small).
  */
case class Lake(name: String, tables: Seq[LakeTable], familyOf: Map[String, String],
                queryTables: Seq[String]) {

  /** Ground-truth unionable tables for a query table (same family). */
  def unionableGroundTruth(table: String): Set[String] = {
    val fam = familyOf(table)
    familyOf.collect { case (t, f) if f == fam && t != table => t }.toSet
  }

  def avgUnionable: Double =
    queryTables.map(t => unionableGroundTruth(t).size).sum.toDouble /
      math.max(1, queryTables.size)

  def totalSizeBytes: Long = tables.map(_.sizeBytes).sum
  def avgRows: Double      = tables.map(_.rowCount).sum.toDouble / tables.size
  def totalColumns: Int    = tables.map(_.columns.size).sum

  /** The whole lake as profiler cells (dataset = lake name). */
  def cells(spark: SparkSession): DataFrame = {
    import spark.implicits._
    val all = tables.iterator.flatMap { t =>
      t.rows.iterator.zipWithIndex.flatMap { case (row, ri) =>
        t.columns.iterator.zip(row.iterator).map { case (c, v) =>
          DataProfiler.Cell(name, t.name, c, ri.toLong, v)
        }
      }
    }.toSeq
    spark.createDataset(all).toDF()
  }
}

/** Generates the four data-discovery benchmarks of §6.1 at container
  * scale (see DESIGN.md §3): base tables drawn from themed column
  * archetypes, horizontally + vertically partitioned into unionable
  * families; "hard" mode (the D3L-like lake) additionally renames
  * columns with synonyms and rescales numeric units so unionability is
  * not trivially lexical.
  */
object LakeBench {

  /** Benchmark spec; all generation is deterministic in the spec. */
  case class Spec(name: String, nFamilies: Int, partitionsPerFamily: Int,
                  baseRows: Int, colsMin: Int, colsMax: Int, hard: Boolean,
                  nQuery: Int, seed: Long)

  /** D3L Small stand-in (654 real tables → 60 hard-mode tables). */
  val d3lLite: Spec = Spec("d3l_lite", 12, 5, 800, 6, 10, hard = true, nQuery = 10, seed = 11)
  /** TUS Small stand-in (1,530 synthetic tables → 120). */
  val tusLite: Spec = Spec("tus_lite", 20, 6, 500, 6, 10, hard = false, nQuery = 15, seed = 12)
  /** SANTOS Small stand-in (550 → 60). */
  val santosLiteSmall: Spec = Spec("santos_lite_small", 12, 5, 400, 6, 10, hard = false, nQuery = 10, seed = 13)
  /** SANTOS Large stand-in (11,090 → 600; scalability lake). */
  val santosLiteLarge: Spec = Spec("santos_lite_large", 75, 8, 500, 6, 10, hard = false, nQuery = 12, seed = 14)

  /** Per-family distribution parameters — families must differ so that
    * cross-family columns of the same archetype are separable.
    */
  private case class FamilyParams(
      theme: String,
      scale: Double,
      sigma: Double,
      yearBase: Int,
      persons: IndexedSeq[String],
      countries: IndexedSeq[String],
      cities: IndexedSeq[String],
      orgs: IndexedSeq[String],
      languages: IndexedSeq[String],
      vocab: IndexedSeq[String],
      idPrefix: String,
  )

  private val Themes = Vector(
    "sales", "housing", "patients", "flights", "movies", "students",
    "energy", "sports", "banking", "retail", "weather", "vehicles",
    "employees", "insurance", "crops", "shipping", "hotels", "music",
    "restaurants", "libraries", "parks", "schools", "clinics", "stores",
    "games", "surveys", "rentals", "permits", "inspections", "grants",
  )

  private def slice[A](xs: Seq[A], rng: Random, fracMin: Double, fracMax: Double): IndexedSeq[A] = {
    val n = math.max(3, (xs.size * (fracMin + rng.nextDouble() * (fracMax - fracMin))).toInt)
    rng.shuffle(xs.toIndexedSeq).take(n)
  }

  private def familyParams(familyIdx: Int, rng: Random): FamilyParams = FamilyParams(
    theme = Themes(familyIdx % Themes.size) +
      (if (familyIdx >= Themes.size) (familyIdx / Themes.size).toString else ""),
    scale = math.pow(10.0, rng.nextDouble() * 4.0),
    sigma = 0.3 + rng.nextDouble() * 1.2,
    yearBase = 1970 + rng.nextInt(45),
    persons = slice(Ner.Persons, rng, 0.3, 0.6),
    countries = slice(Ner.Countries, rng, 0.3, 0.6),
    cities = slice(Ner.Cities, rng, 0.3, 0.6),
    orgs = slice(Ner.Orgs, rng, 0.3, 0.6),
    languages = slice(Ner.Languages, rng, 0.3, 0.7),
    vocab = slice(WordEmbedding.sampleVocabulary, rng, 0.2, 0.4),
    idPrefix = ('A' + rng.nextInt(26)).toChar.toString + ('A' + rng.nextInt(26)).toChar.toString,
  )

  /** A column archetype: canonical label, synonym labels for hard-mode
    * renaming, fine-grained flavour, and a value generator.
    */
  private case class Archetype(label: String, gen: (Random, FamilyParams) => String,
                               numeric: Boolean = false)

  private def cap(s: String): String = s.substring(0, 1).toUpperCase + s.substring(1)

  private val archetypes: Vector[Archetype] = Vector(
    Archetype("person_name", (r, f) =>
      s"${cap(f.persons(r.nextInt(f.persons.size)))} ${cap(f.persons(r.nextInt(f.persons.size)))}"),
    Archetype("country", (r, f) => cap(f.countries(r.nextInt(f.countries.size)))),
    Archetype("city", (r, f) => cap(f.cities(r.nextInt(f.cities.size)))),
    Archetype("company", (r, f) => cap(f.orgs(r.nextInt(f.orgs.size)))),
    Archetype("language", (r, f) => cap(f.languages(r.nextInt(f.languages.size)))),
    Archetype("review", (r, f) => {
      val n = 4 + r.nextInt(5)
      (0 until n).map(_ => f.vocab(r.nextInt(f.vocab.size))).mkString(" ")
    }),
    Archetype("description", (r, f) => {
      val n = 3 + r.nextInt(4)
      (0 until n).map(_ => f.vocab(r.nextInt(f.vocab.size))).mkString(" ")
    }),
    Archetype("price", (r, f) =>
      f"${math.exp(r.nextGaussian() * f.sigma) * f.scale}%.2f", numeric = true),
    Archetype("salary", (r, f) =>
      f"${(1.0 + math.abs(r.nextGaussian()) * f.sigma) * f.scale * 10}%.2f", numeric = true),
    Archetype("score", (r, f) =>
      f"${math.min(5.0, math.max(0.0, 2.5 + r.nextGaussian() * f.sigma))}%.1f", numeric = true),
    Archetype("age", (r, f) => (18 + (f.yearBase % 20) + r.nextInt(40)).toString, numeric = true),
    Archetype("quantity", (r, f) =>
      (1 + (math.abs(r.nextGaussian()) * f.sigma * 20).toInt).toString, numeric = true),
    Archetype("active", (r, f) =>
      if (r.nextDouble() < 0.2 + (f.scale % 1.0) * 0.6) "true" else "false"),
    Archetype("date", (r, f) => {
      val y = f.yearBase + r.nextInt(8)
      f"$y%04d-${1 + r.nextInt(12)}%02d-${1 + r.nextInt(28)}%02d"
    }),
    Archetype("id", (r, f) => s"${f.idPrefix}-${10000 + r.nextInt(90000)}"),
    Archetype("phone", (r, _) =>
      s"${100 + r.nextInt(900)}-${100 + r.nextInt(900)}-${1000 + r.nextInt(9000)}"),
  )

  /** Generate a lake deterministically from its spec. */
  def generate(spec: Spec): Lake = {
    val rng     = new Random(spec.seed)
    val tables   = Vector.newBuilder[LakeTable]
    val familyOf = Map.newBuilder[String, String]
    val queries  = Vector.newBuilder[String]

    (0 until spec.nFamilies).foreach { fi =>
      val fp    = familyParams(fi, rng)
      val nCols = spec.colsMin + rng.nextInt(spec.colsMax - spec.colsMin + 1)
      val cols  = rng.shuffle(archetypes).take(nCols)
      // canonical column names: mostly theme-prefixed (real lake columns
      // are mostly domain-specific); the remaining 20% generic names
      // create the cross-family label collisions real lakes have
      val names = cols.map { a =>
        if (rng.nextDouble() < 0.8) s"${fp.theme}_${a.label}" else a.label
      }
      // base rows
      val base: Vector[Vector[String]] = Vector.tabulate(spec.baseRows) { _ =>
        cols.map(a => a.gen(rng, fp)).toVector
      }

      (0 until spec.partitionsPerFamily).foreach { pi =>
        val tname = s"${fp.theme}_p$pi"
        // horizontal partition: contiguous slice of 40–80% of base rows
        val frac  = 0.4 + rng.nextDouble() * 0.4
        val take  = math.max(20, (spec.baseRows * frac).toInt)
        val start = rng.nextInt(math.max(1, spec.baseRows - take + 1))
        val sliceRows = base.slice(start, start + take)
        // vertical partition: keep each column w.p. 0.8, at least 3
        var keep = cols.indices.filter(_ => rng.nextDouble() < 0.8)
        if (keep.size < 3) keep = cols.indices.take(3)

        val (keptNames, keptRows) =
          if (!spec.hard) {
            (keep.map(names), sliceRows.map(r => keep.map(r).toVector))
          } else {
            // hard mode: synonym renames + per-partition unit rescaling
            val renamed = keep.map { i =>
              val a    = cols(i)
              val syns = WordEmbedding.synonymsOf(a.label)
              val syn  = syns(rng.nextInt(syns.size))
              if (names(i).startsWith(fp.theme + "_")) s"${fp.theme}_$syn" else syn
            }
            val unit = keep.map { i =>
              if (cols(i).numeric && rng.nextDouble() < 0.5)
                Seq(0.092903, 100.0, 0.01, 2.20462)(rng.nextInt(4))
              else 1.0
            }
            val rows = sliceRows.map { r =>
              keep.zipWithIndex.map { case (ci, j) =>
                val v = r(ci)
                if (unit(j) == 1.0) v
                else f"${v.toDouble * unit(j)}%.4f"
              }.toVector
            }
            (renamed, rows)
          }

        tables += LakeTable(spec.name, tname, keptNames, keptRows)
        familyOf += tname -> fp.theme
        if (fi < spec.nQuery && pi == 0) queries += tname
      }
    }

    Lake(spec.name, tables.result(), familyOf.result(), queries.result())
  }
}
