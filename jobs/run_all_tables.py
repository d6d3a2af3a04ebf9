"""Run every evaluation table in one Spark session and dump the measured
rows to ``results/tables.json`` (consumed by EXPERIMENTS.md). Equivalent to
running each jobs/table*.py separately, but shares table loading."""
import json
import os
import sys

from _common import session

from repro import tables


def main():
    out_path = os.path.join(os.path.dirname(__file__), "..", "results", "tables.json")
    os.makedirs(os.path.dirname(out_path), exist_ok=True)
    spark = session("run-all-tables")
    results = {}

    print("== table6 ==", flush=True)
    results["table6"] = tables.table6()

    print("== table2 (JOB pool, 3 modes) ==", flush=True)
    t2 = tables.table2(spark)
    results["table2"] = t2["rows"]
    results["table2_per_query"] = t2["per_query"]

    print("== table3 (rule ablation) ==", flush=True)
    results["table3"] = tables.table3(spark)

    print("== table4 (CE scenarios) ==", flush=True)
    results["table4"] = tables.table4(spark)

    print("== table5 (opt time) ==", flush=True)
    results["table5"] = tables.table5(spark)

    print("== speedup summary (sgpb/lsqb/tpch) ==", flush=True)
    pool = [
        q for q in sorted(__import__("repro.workloads", fromlist=["all_queries"]).all_queries())
        if q.split("-")[0] in ("sgpb", "lsqb", "tpch")
    ]
    results["speedups"] = tables.speedup_summary(spark, queries=pool)

    with open(out_path, "w") as f:
        json.dump(results, f, indent=1, default=str)
    print("wrote", out_path, flush=True)
    for key in ("table2", "table3", "table4", "table5", "table6"):
        print(f"\n== {key} ==")
        print(tables.render(results[key]))
    print("\n== speedups ==")
    print(tables.render(results["speedups"]))
    spark.stop()


if __name__ == "__main__":
    main()
