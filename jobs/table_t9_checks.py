"""T9 (Sec. 9.5): safety / reuse check overhead (no Spark needed).

    python jobs/table_t9_checks.py
"""
from _common import save_rows

from repro.experiments import t9_checks


def main() -> None:
    rows = t9_checks.run()
    print(t9_checks.format_table(rows))
    print("saved:", save_rows("t9", rows))


if __name__ == "__main__":
    main()
