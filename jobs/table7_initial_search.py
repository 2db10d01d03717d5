"""Job: reproduce Table 7 (effect of the initial search) — NNinit metrics
and first-search weight sums for |S_q|=2..5."""
from repro.tables.common import fmt_table
from repro.tables import table7


def main() -> None:
    rows = table7.rows()
    print("\n== Table 7: effect of initial search (NNinit) ==")
    print(fmt_table(rows, table7.COLUMNS))
    print("\nShape target: weight sum << existing ws; existing ws constant in |Sq|;")
    print("ratio < 1 and rising with |Sq|; # routes ~1.3-2.4.")


if __name__ == "__main__":
    main()
