"""Job: reproduce Table 9 / §7.5 usecase — SkySRs for a bar -> restaurant ->
bar trip with a destination on tokyo-lite, with category names."""
from repro.tables.common import fmt_table
from repro.tables import table9


def main() -> None:
    rows = table9.rows()
    print("\n== Table 9: usecase SkySRs (tokyo-lite, destination variant) ==")
    print(fmt_table(rows, table9.COLUMNS))
    print("\nPaper example: perfect-match route 7451 m vs semantic route 1295 m —")
    print("expect the loosest-semantic route here to be markedly shorter too.")


if __name__ == "__main__":
    main()
