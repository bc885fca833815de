package repro.nexmark

import org.apache.spark.sql.DataFrame
import repro.{Oracle, SparkSpec}

/** Relational-semantics oracle: the Megaphone NEXMark implementations (run
  * end-to-end on the simulated engine) must agree with DuckDB SQL over the
  * same event set.
  */
class QueryOracleSpec extends SparkSpec {
  import spark.implicits._
  import QueryTestDrive._

  private val Epochs = 60
  private lazy val (megaByQ, events) = {
    val e   = mega(1, Epochs)._2 // generator is deterministic: reuse events
    val res = (1 to 8).map(q => q -> mega(q, Epochs)._1).toMap
    (res, e)
  }

  private lazy val persons: DataFrame =
    events.collect { case p: Person => (p.id, p.name, p.city, p.state, p.time) }
      .toDF("id", "name", "city", "state", "ts")
  private lazy val auctions: DataFrame =
    events.collect { case a: Auction => (a.id, a.seller, a.category, a.expires, a.time) }
      .toDF("id", "seller", "category", "expires", "ts")
  private lazy val bids: DataFrame =
    events.collect { case b: Bid => (b.auction, b.bidder, b.price, b.time) }
      .toDF("auction", "bidder", "price", "ts")

  test("Q1 equals SQL currency conversion") {
    val df = megaByQ(1).map(_.asInstanceOf[(Long, Long, Long)]).toDF("auction", "bidder", "price")
    Oracle.assertEquivalent(
      df,
      "SELECT CAST(auction AS BIGINT) AS auction, CAST(bidder AS BIGINT) AS bidder, " +
        "CAST(price AS BIGINT) * 908 // 1000 AS price FROM bids",
      "bids" -> bids,
    )
  }

  test("Q2 equals SQL selection") {
    val df = megaByQ(2).map(_.asInstanceOf[(Long, Long)]).toDF("auction", "price")
    Oracle.assertEquivalent(
      df,
      "SELECT CAST(auction AS BIGINT) AS auction, CAST(price AS BIGINT) AS price " +
        "FROM bids WHERE CAST(auction AS BIGINT) % 123 = 0",
      "bids" -> bids,
    )
  }

  test("Q3 equals SQL person-auction join") {
    val df = megaByQ(3).map(_.asInstanceOf[(String, String, String, Long)]).toDF("name", "city", "state", "id")
    Oracle.assertEquivalent(
      df,
      "SELECT p.name AS name, p.city AS city, p.state AS state, CAST(a.id AS BIGINT) AS id " +
        "FROM auctions a JOIN persons p ON CAST(p.id AS BIGINT) = CAST(a.seller AS BIGINT) " +
        "WHERE CAST(a.category AS INT) = 10 AND p.state IN ('OR','ID','CA')",
      "auctions" -> auctions,
      "persons"  -> persons,
    )
  }

  test("Q4 final per-category averages equal SQL winners aggregate") {
    val finals = megaByQ(4)
      .map(_.asInstanceOf[(Long, Long)])
      .groupBy(_._1)
      .map { case (cat, xs) => (cat, xs.last._2) }
      .toSeq
      .toDF("category", "avgprice")
    Oracle.assertEquivalent(
      finals,
      "WITH wins AS (SELECT a.id, CAST(a.category AS BIGINT) AS category, MAX(CAST(b.price AS BIGINT)) AS price " +
        "FROM auctions a JOIN bids b ON CAST(b.auction AS BIGINT) = CAST(a.id AS BIGINT) " +
        "AND CAST(b.ts AS BIGINT) <= CAST(a.expires AS BIGINT) GROUP BY a.id, a.category) " +
        "SELECT category, SUM(price) // COUNT(*) AS avgprice FROM wins GROUP BY category",
      "auctions" -> auctions,
      "bids"     -> bids,
    )
  }

  test("Q6 final last-10 averages per seller equal SQL window aggregate") {
    val finals = megaByQ(6)
      .map(_.asInstanceOf[(Long, Long)])
      .groupBy(_._1)
      .map { case (seller, xs) => (seller, xs.last._2) }
      .toSeq
      .toDF("seller", "avgprice")
    Oracle.assertEquivalent(
      finals,
      "WITH wins AS (SELECT a.id AS id, CAST(a.seller AS BIGINT) AS seller, CAST(a.expires AS BIGINT) AS expires, " +
        "MAX(CAST(b.price AS BIGINT)) AS price FROM auctions a " +
        "JOIN bids b ON CAST(b.auction AS BIGINT) = CAST(a.id AS BIGINT) " +
        "AND CAST(b.ts AS BIGINT) <= CAST(a.expires AS BIGINT) GROUP BY a.id, a.seller, a.expires), " +
        "ranked AS (SELECT seller, price, ROW_NUMBER() OVER " +
        "(PARTITION BY seller ORDER BY expires DESC, id DESC) AS rn FROM wins) " +
        "SELECT seller, SUM(price) // COUNT(*) AS avgprice FROM ranked WHERE rn <= 10 GROUP BY seller",
      "auctions" -> auctions,
      "bids"     -> bids,
    )
  }

  test("Q7 per-window maxima equal SQL tumbling-window aggregate") {
    val df = megaByQ(7)
      .map(_.asInstanceOf[(Long, Long, Long, Long)])
      .map { case (w, _, _, price) => (w, price) }
      .toDF("w", "price")
    Oracle.assertEquivalent(
      df,
      s"SELECT CAST(ts AS BIGINT) // ${config(1).windowNs} AS w, MAX(CAST(price AS BIGINT)) AS price " +
        "FROM bids GROUP BY 1",
      "bids" -> bids,
    )
  }

  test("Q8 equals SQL distinct same-window person-seller join") {
    val df = megaByQ(8).map(_.asInstanceOf[(Long, Long)]).toDF("id", "w")
    val W  = config(1).q8WindowNs
    Oracle.assertEquivalent(
      df,
      s"SELECT DISTINCT CAST(p.id AS BIGINT) AS id, CAST(p.ts AS BIGINT) // $W AS w " +
        "FROM persons p JOIN auctions a ON CAST(a.seller AS BIGINT) = CAST(p.id AS BIGINT) " +
        s"AND CAST(a.ts AS BIGINT) // $W = CAST(p.ts AS BIGINT) // $W",
      "persons"  -> persons,
      "auctions" -> auctions,
    )
  }
}
