"""Job: reproduce Table 8 (priority queue arrangement) — total visited
vertices for the proposed vs distance-based queue, |S_q|=2..5."""
from repro.tables.common import fmt_table
from repro.tables import table8


def main() -> None:
    rows = table8.rows()
    print("\n== Table 8: visited vertices, proposed vs distance-based PQ ==")
    print(fmt_table(rows, table8.COLUMNS))
    print("\nShape target: proposed < distance-based, gap widening with |Sq|.")


if __name__ == "__main__":
    main()
