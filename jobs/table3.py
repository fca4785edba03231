"""Reproduce Table 3 of the paper (see repro.eval.tables.table3)."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import build_run, show  # noqa: E402

from repro.eval.tables import table3  # noqa: E402


def main() -> None:
    run = build_run("datavinci-table3")
    show(table3(run))


if __name__ == "__main__":
    main()
