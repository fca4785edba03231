"""Reproduce Table 7 of the paper (see repro.eval.tables.table7)."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import build_run, show  # noqa: E402

from repro.eval.tables import table7  # noqa: E402


def main() -> None:
    run = build_run("datavinci-table7")
    show(table7(run))


if __name__ == "__main__":
    main()
