package repro.datasets

import java.io.File
import org.apache.spark.sql.SparkSession
import scala.util.Random

/** Synthetic stand-in for the Reddit comments dump (paper §6.1, §6.5–6.6):
  * JSON-Lines objects shaped like the public dataset
  * `{author, subreddit, body, score, created_utc, controversiality, gilded}`.
  *
  * `score` is heavy-tailed (discrete log-normal-ish), so the paper's
  * "highly filtering query" (`score ge 1000`) selects a ~1e-4 fraction, and
  * `body` dominates the record size (~250 bytes avg) like real comments.
  * Deterministic in (n, seed).
  */
object RedditData {

  private val words = Vector(
    "the", "quick", "brown", "fox", "jumps", "over", "lazy", "dog", "reddit",
    "comment", "thread", "upvote", "karma", "post", "link", "actually",
    "literally", "pretty", "much", "this", "that", "what", "when", "where",
    "people", "think", "point", "right", "wrong", "time", "year", "game",
    "movie", "music", "science", "politics", "news", "funny", "picture")

  val subreddits: Vector[String] = Vector(
    "AskReddit", "funny", "pics", "gaming", "worldnews", "todayilearned",
    "science", "movies", "music", "aww", "videos", "news", "technology",
    "programming", "dataisbeautiful", "sports", "books", "history", "space",
    "food")

  def line(i: Long, seed: Long): String = {
    val rng = new Random(seed ^ (i * 0xC2B2AE3D27D4EB4FL))
    val author    = s"user_${rng.nextInt(2_000_000)}"
    val subreddit = subreddits((math.pow(rng.nextDouble(), 2.0) * subreddits.size).toInt
                                 .min(subreddits.size - 1))
    val nWords    = 5 + rng.nextInt(60)
    val body      = Seq.fill(nWords)(words(rng.nextInt(words.size))).mkString(" ")
    // heavy-tailed score: most comments ~1, few in the thousands
    val u     = rng.nextDouble()
    val score = math.max(-50L, (math.exp(rng.nextGaussian() * 2.2 + 0.3)).toLong *
                                (if (u < 0.04) -1 else 1))
    val created = 1199145600L + (i % 220_000_000L) // 2008..2015 range
    val contro  = if (rng.nextDouble() < 0.02) 1 else 0
    val gilded  = if (rng.nextDouble() < 0.001) 1 else 0
    s"""{"author": "$author", "subreddit": "$subreddit", "body": "$body", """ +
      s""""score": $score, "created_utc": $created, "controversiality": $contro, """ +
      s""""gilded": $gilded}"""
  }

  def generate(spark: SparkSession, path: String, n: Long,
               partitions: Int = 16, seed: Long = 7): String = {
    if (new File(path, "_SUCCESS").exists()) return path
    val s = seed
    spark.sparkContext
      .range(0L, n, numSlices = partitions)
      .map(i => line(i, s))
      .saveAsTextFile(path)
    path
  }
}
