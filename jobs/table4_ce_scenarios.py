"""Reproduce paper Table 4: Yannakakis+ runtime under accurate / estimated /
worst-case cardinality estimation, vs the native plan."""
from _common import session

from repro import tables


def main():
    spark = session("table4-ce-scenarios")
    rows = tables.table4(spark)
    print("\n== Table 4 (measured, SparkSQL/local) ==")
    print(tables.render(rows))
    print("\n== Table 4 (paper, DuckDB) ==")
    paper = [dict(query=q, **v) for q, v in tables.PAPER_TABLE4_DUCKDB.items()]
    print(tables.render(paper))
    spark.stop()


if __name__ == "__main__":
    main()
