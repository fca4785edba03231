"""Reproduce Table 5 of the paper (see repro.eval.tables.table5)."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import build_run, show  # noqa: E402

from repro.eval.tables import table5  # noqa: E402


def main() -> None:
    run = build_run("datavinci-table5")
    show(table5(run))


if __name__ == "__main__":
    main()
