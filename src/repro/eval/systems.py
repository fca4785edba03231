"""System registry: name → per-table detect/repair callable.

Every system takes a wide pandas table (all strings) plus optional
semi-supervision labels and returns a list of
:class:`repro.baselines.common.Prediction`. Detection-only systems are
paired with the GPT repair head exactly as in §4.3 ("we add a call to
GPT-3.5 where we include the outlier value … and ask the model to
generate the repaired value").

DataVinci ablation variants (§5.4) are registered alongside the full
system so Table 9 reuses the same harness.
"""
from __future__ import annotations

from typing import Callable

import pandas as pd

from ..baselines import (
    autodetect_lite,
    gpt_sim,
    holoclean_lite,
    potters_wheel,
    raha_lite,
    t5_sim,
    wmrr,
)
from ..baselines.common import Labels, Prediction
from ..core.datavinci import DataVinciConfig, clean_table

SystemFn = Callable[[pd.DataFrame, Labels | None], list[Prediction]]


def _with_gpt_repair(detect: SystemFn) -> SystemFn:
    def run(table: pd.DataFrame, labels: Labels | None = None) -> list[Prediction]:
        out = []
        for p in detect(table, labels):
            repair = gpt_sim.repair_cell(table, p.column, p.row)
            out.append(Prediction(p.column, p.row, p.original, repair))
        return out

    return run


def _datavinci(config: DataVinciConfig) -> SystemFn:
    def run(table: pd.DataFrame, labels: Labels | None = None) -> list[Prediction]:
        return [
            Prediction(r.column, r.row, r.original, r.repaired)
            for r in clean_table(table, config)
        ]

    return run


SYSTEMS: dict[str, SystemFn] = {
    "WMRR": wmrr.run,
    "HoloClean": holoclean_lite.run,
    "Raha + GPT-3.5": _with_gpt_repair(raha_lite.run),
    "Potters-Wheel + GPT-3.5": _with_gpt_repair(potters_wheel.run),
    "Auto-Detect + GPT-3.5": _with_gpt_repair(autodetect_lite.run),
    "T5": t5_sim.run,
    "GPT-3.5": gpt_sim.run,
    "DataVinci": _datavinci(DataVinciConfig()),
    # §5.4 ablations (evaluated on the Synthetic benchmark, Table 9):
    "DataVinci (no semantic abstraction)": _datavinci(
        DataVinciConfig(semantic=False)
    ),
    "DataVinci (limited semantic concretization)": _datavinci(
        DataVinciConfig(semantic_repair=False)
    ),
    "DataVinci (no learned concretization)": _datavinci(
        DataVinciConfig(learned_concretization=False)
    ),
    "DataVinci (edit distance ranking)": _datavinci(
        DataVinciConfig(edit_distance_ranking=True)
    ),
}

# Detection-only rows of Table 5 (their fire rate/precision is about the
# detector; the GPT head is only used for repairs in Table 6).
DETECTION_VIEW: dict[str, SystemFn] = {
    "Raha": raha_lite.run,
    "Potters-Wheel": potters_wheel.run,
    "Auto-Detect": autodetect_lite.run,
}


def get_system(name: str) -> SystemFn:
    if name in SYSTEMS:
        return SYSTEMS[name]
    if name in DETECTION_VIEW:
        return DETECTION_VIEW[name]
    raise KeyError(f"unknown system {name!r}")
