package repro.workloads

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.SynthData
import repro.algebra._

/** Crimes workload (paper Sec. 9.1/9.4): top-5 areas and HAVING over blocks. */
object Crimes {
  val crimes: TableRef = TableRef("crimes", Seq(
    "cr_id" -> TLong, "area" -> TLong, "block" -> TString,
    "ctype" -> TString, "cyear" -> TInt))

  /** C-Q1: the 5 areas with the most crimes. */
  val cq1: Op = TopK(Seq(("cnt", false), ("area", true)), 5,
    Aggregate(Seq("area"), Seq(Agg(FCount, Col("cr_id"), "cnt")), crimes))

  /** C-Q2: number of blocks with more than `threshold` crimes. */
  def cq2(threshold: Long): Op =
    Aggregate(Seq.empty, Seq(Agg(FCount, Col("block"), "nblocks")),
      Select(Col("cnt") > Lit(threshold),
        Aggregate(Seq("block"), Seq(Agg(FCount, Col("cr_id"), "cnt")), crimes)))

  /** Parameterized templates for the end-to-end experiment (LIMIT→HAVING,
    * as in Sec. 9.5): counts per area/block/type above a threshold, with
    * optional year interval parameters.
    */
  val tAreaHaving: Op = Select(Col("cnt") > Param("t"),
    Aggregate(Seq("area"), Seq(Agg(FCount, Col("cr_id"), "cnt")), crimes))

  val tBlockHaving: Op = Select(Col("cnt") > Param("t"),
    Aggregate(Seq("block"), Seq(Agg(FCount, Col("cr_id"), "cnt")), crimes))

  val tAreaYearHaving: Op = Select(Col("cnt") > Param("t"),
    Aggregate(Seq("area"), Seq(Agg(FCount, Col("cr_id"), "cnt")),
      Select((Col("cyear") >= Param("y1")) && (Col("cyear") <= Param("y2")), crimes)))

  val tTypeHaving: Op = Select(Col("cnt") > Param("t"),
    Aggregate(Seq("ctype"), Seq(Agg(FCount, Col("cr_id"), "cnt")), crimes))

  def catalog(spark: SparkSession, sf: Double): Map[String, DataFrame] =
    Map("crimes" -> SynthData.crimes(spark, sf))
}

/** MovieLens workload: top-10 movies, HAVING count, weighted popularity. */
object Movies {
  val movies: TableRef = TableRef("movies",
    Seq("movieid" -> TLong, "myear" -> TInt, "genre" -> TString))
  val ratings: TableRef = TableRef("ratings",
    Seq("r_movieid" -> TLong, "r_userid" -> TLong, "r_stars" -> TInt))
  val tags: TableRef = TableRef("tags",
    Seq("t_movieid" -> TLong, "t_userid" -> TLong, "tag" -> TString))

  /** M-Q1: the 10 movies with the most ratings. */
  val mq1: Op = TopK(Seq(("cnt", false), ("movieid", true)), 10,
    Join(movies,
      Aggregate(Seq("r_movieid"), Seq(Agg(FCount, Col("r_userid"), "cnt")), ratings),
      Seq(("movieid", "r_movieid"))))

  /** M-Q2: number of movies with more than `threshold` ratings. */
  def mq2(threshold: Long): Op =
    Aggregate(Seq.empty, Seq(Agg(FCount, Col("r_movieid"), "nmovies")),
      Select(Col("cnt") > Lit(threshold),
        Aggregate(Seq("r_movieid"), Seq(Agg(FCount, Col("r_userid"), "cnt")), ratings)))

  /** M-Q3: top-10 by popularity = #ratings + 2 × #tags. */
  val mq3: Op = TopK(Seq(("pop", false), ("r_movieid", true)), 10,
    Project(Seq((Col("r_movieid"), "r_movieid"),
                (Col("cnt_r") + Lit(2L) * Col("cnt_t"), "pop")),
      Join(Aggregate(Seq("r_movieid"), Seq(Agg(FCount, Col("r_userid"), "cnt_r")), ratings),
           Aggregate(Seq("t_movieid"), Seq(Agg(FCount, Col("t_userid"), "cnt_t")), tags),
           Seq(("r_movieid", "t_movieid")))))

  def catalog(spark: SparkSession, sf: Double): Map[String, DataFrame] = Map(
    "movies"  -> SynthData.movies(spark, sf),
    "ratings" -> SynthData.ratings(spark, sf),
    "tags"    -> SynthData.tags(spark, sf))
}

/** Stack Overflow workload: top users by posts/comments/badges + HAVING. */
object StackOverflowW {
  val users: TableRef = TableRef("users",
    Seq("u_id" -> TLong, "u_rep" -> TLong, "u_year" -> TInt))
  val posts: TableRef = TableRef("posts",
    Seq("p_id" -> TLong, "p_owner" -> TLong, "p_score" -> TInt))
  val comments: TableRef = TableRef("comments",
    Seq("cm_id" -> TLong, "cm_user" -> TLong, "cm_score" -> TInt))
  val badges: TableRef = TableRef("badges",
    Seq("b_id" -> TLong, "b_user" -> TLong, "b_name" -> TString))

  private def topBy(rel: TableRef, fk: String, cntOf: String, alias: String): Op =
    TopK(Seq((alias, false), ("u_id", true)), 10,
      Aggregate(Seq("u_id"), Seq(Agg(FCount, Col(cntOf), alias)),
        Join(users, rel, Seq(("u_id", fk)))))

  /** S-Q1/S-Q2/S-Q4: the 10 users with the most posts/comments/badges. */
  val sq1: Op = topBy(posts, "p_owner", "p_id", "np")
  val sq2: Op = topBy(comments, "cm_user", "cm_id", "nc")
  val sq4: Op = topBy(badges, "b_user", "b_id", "nb")

  /** S-Q5: users with between `lo` and `hi` comments (HAVING interval). */
  def sq5(lo: Long, hi: Long): Op =
    Select((Col("nc") >= Lit(lo)) && (Col("nc") <= Lit(hi)),
      Aggregate(Seq("u_id"), Seq(Agg(FCount, Col("cm_id"), "nc")),
        Join(users, comments, Seq(("u_id", "cm_user")))))

  /** Parameterized templates for the end-to-end experiment. */
  val tPostsHaving: Op = Select(Col("np") > Param("t"),
    Aggregate(Seq("u_id"), Seq(Agg(FCount, Col("p_id"), "np")),
      Join(users, posts, Seq(("u_id", "p_owner")))))

  val tCommentsInterval: Op = Select((Col("nc") >= Param("lo")) && (Col("nc") <= Param("hi")),
    Aggregate(Seq("u_id"), Seq(Agg(FCount, Col("cm_id"), "nc")),
      Join(users, comments, Seq(("u_id", "cm_user")))))

  val tBadgesHaving: Op = Select(Col("nb") > Param("t"),
    Aggregate(Seq("u_id"), Seq(Agg(FCount, Col("b_id"), "nb")),
      Join(users, badges, Seq(("u_id", "b_user")))))

  def catalog(spark: SparkSession, sf: Double): Map[String, DataFrame] = Map(
    "users"    -> SynthData.sofUsers(spark, sf),
    "posts"    -> SynthData.sofPosts(spark, sf),
    "comments" -> SynthData.sofComments(spark, sf),
    "badges"   -> SynthData.sofBadges(spark, sf))
}
