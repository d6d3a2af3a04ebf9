"""Reproduce paper Table 3: rule-based optimization ablation on JOB-1a and
JOB-4a (Base = native; Primitive = Yannakakis+ with all rules off; PK-FK /
Annot / both = individual rule switches)."""
from _common import session

from repro import tables


def main():
    spark = session("table3-rule-ablation")
    rows = tables.table3(spark)
    print("\n== Table 3 (measured, SparkSQL/local) ==")
    print(tables.render(rows))
    print("\n== Table 3 (paper, DuckDB & PostgreSQL) ==")
    for q, engines in tables.PAPER_TABLE3.items():
        for eng, vals in engines.items():
            print(q, eng, vals)
    spark.stop()


if __name__ == "__main__":
    main()
