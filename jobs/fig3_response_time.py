"""Job: Figure 3 counterpart — mean response time of BSSR / BSSR w/o Opt /
Dij / PNE and the distributed Spark pipeline across |S_q|.

Baselines run at reduced scale (REPRO_SCALE, default 0.2): the paper's own
|S_q|=5 baseline bars are missing after a month of runtime; ours are
omitted the same way.  Set REPRO_SPARK=0 to skip the Spark pipeline column.
"""
import os

from repro.tables.common import fmt_table
from repro.tables.figures import fig3_rows


def main() -> None:
    spark = None
    if os.environ.get("REPRO_SPARK", "1") != "0":
        from repro.tables.session import get_spark

        spark = get_spark("fig3")
    rows = fig3_rows(spark=spark)
    cols = list(rows[0].keys())
    print("\n== Fig. 3 counterpart: mean response time (ms) ==")
    print(fmt_table(rows, cols))
    print("\nShape target: BSSR fastest/flattest; Dij/PNE super-linear in |Sq|.")
    if spark is not None:
        spark.stop()


if __name__ == "__main__":
    main()
