"""Reproduce paper Table 2: running-time statistics over the JOB pool for
native / Yannakakis / Yannakakis+ (SparkSQL engine)."""
from _common import session

from repro import tables


def main():
    spark = session("table2-job-stats")
    result = tables.table2(spark)
    print("\n== Table 2 (measured, SparkSQL/local, JOB-lite sf=1 dup=3) ==")
    print(tables.render(result["rows"]))
    print("\n== Table 2 (paper, SparkSQL, JOB @ IMDB scaled 10-100x) ==")
    paper = [dict(mode=m, **v) for m, v in tables.PAPER_TABLE2_SPARKSQL.items()]
    print(tables.render(paper))
    print("\nper-query seconds:")
    pq = [
        dict(query=q, **{m: result["per_query"][q][m] for m in
                         ("native", "yannakakis", "yannakakis+")})
        for q in result["queries"]
    ]
    print(tables.render(pq))
    spark.stop()


if __name__ == "__main__":
    main()
