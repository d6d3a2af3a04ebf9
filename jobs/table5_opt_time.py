"""Reproduce paper Table 5: optimization time vs query size for 12
representative queries, alongside native/Yannakakis+ runtimes and Spark's
own planning time."""
from _common import session

from repro import tables


def main():
    spark = session("table5-opt-time")
    rows = tables.table5(spark)
    print("\n== Table 5 (measured, SparkSQL/local) ==")
    print(tables.render(rows))
    print("\n== Table 5 (paper, DuckDB runtimes + rewriter opt time) ==")
    paper = [dict(query=q, **v) for q, v in tables.PAPER_TABLE5.items()]
    print(tables.render(paper))
    spark.stop()


if __name__ == "__main__":
    main()
