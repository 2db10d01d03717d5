"""Job: Figures 4/5/6 counters — min-distance bound ratios, on-the-fly
cache savings, and SkySR result-set sizes."""
from repro.tables.common import fmt_table
from repro.tables.figures import fig4_rows, fig5_rows, fig6_rows


def main() -> None:
    r4 = fig4_rows()
    print("\n== Fig. 4 counterpart: possible-minimum distances / init length ==")
    print(fmt_table(r4, list(r4[0].keys())))
    print("Shape target: Tokyo/NYC ratios >> Cal (clustered PoIs, §7.3).")
    r5 = fig5_rows()
    print("\n== Fig. 5 counterpart: mDijkstra executions w/ vs w/o caching ==")
    print(fmt_table(r5, list(r5[0].keys())))
    r6 = fig6_rows()
    print("\n== Fig. 6 counterpart: number of SkySRs ==")
    print(fmt_table(r6, list(r6[0].keys())))


if __name__ == "__main__":
    main()
