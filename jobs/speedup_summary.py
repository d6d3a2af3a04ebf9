"""§7.2.1 headline numbers (Figure 9 as a table): run every query of every
benchmark in all three modes; report per-query speedups and per-benchmark
aggregates (how many queries improved, average/max speedup)."""
import statistics

from _common import session

from repro import tables


def main():
    spark = session("speedup-summary")
    rows = tables.speedup_summary(spark)
    print("\n== Per-query runtimes and speedups (SparkSQL/local) ==")
    print(tables.render(rows))
    print("\n== Aggregates per benchmark ==")
    benches = sorted({r["benchmark"] for r in rows})
    agg = []
    for b in benches + ["ALL"]:
        sub = [r for r in rows if b == "ALL" or r["benchmark"] == b]
        sp = [r["speedup_vs_native"] for r in sub]
        spy = [r["speedup_vs_yannakakis"] for r in sub]
        agg.append(
            dict(
                benchmark=b,
                queries=len(sub),
                improved=sum(s > 1 for s in sp),
                avg_speedup=statistics.geometric_mean(sp),
                max_speedup=max(sp),
                avg_vs_yannakakis=statistics.geometric_mean(spy),
            )
        )
    print(tables.render(agg))
    spark.stop()


if __name__ == "__main__":
    main()
