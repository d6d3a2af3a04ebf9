"""Reproduce paper Table 6: SGPB query characteristics — shape, type,
number of predicates, and free-connex status as computed by our own
join-tree machinery (no Spark needed)."""
from repro import tables


def main():
    rows = tables.table6()
    print("\n== Table 6 (computed from our SGPB definitions) ==")
    print(tables.render(rows))
    print("\n== Table 6 (paper) ==")
    paper = [
        dict(query=f"sgpb-{q}", shape=s, type=t, predicates=p, free_connex=fc)
        for q, (s, t, p, fc) in tables.PAPER_TABLE6.items()
    ]
    print(tables.render(paper))


if __name__ == "__main__":
    main()
