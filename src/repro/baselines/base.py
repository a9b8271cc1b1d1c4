"""Tuner protocol and capability flags (paper Table 1).

Every tuning method — the baselines here and the paper's framework in
:mod:`repro.core.controller` — implements the same online interface:
``suggest()`` returns the configuration for the next periodic
execution, ``observe(config, result)`` feeds back what that execution
reported. Capability flags are declared per class and printed by the
Table 1 experiment.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core.bo import RunHistory
from repro.core.config_space import ConfigSpace
from repro.core.objective import ExecResult, TuningProblem

YES, NO, PARTIAL = "yes", "no", "partial"


@dataclass(frozen=True)
class Capabilities:
    """One row of Table 1 (values: yes / no / partial)."""

    general_obj: str = NO
    constraints: str = NO
    noer: str = NO          # "No Offline Evaluation Required"
    safety: str = NO
    adaptive_space: str = NO
    meta_learn: str = NO

    def row(self) -> tuple[str, ...]:
        return (
            self.general_obj, self.constraints, self.noer,
            self.safety, self.adaptive_space, self.meta_learn,
        )


class Tuner:
    """Base online tuner: owns a run history over a config space."""

    name: str = "base"
    capabilities = Capabilities()

    def __init__(self, space: ConfigSpace, problem: TuningProblem, *, seed: int = 0):
        self.space = space
        self.problem = problem
        self.seed = seed
        self.rng = np.random.default_rng(seed)
        self.history = RunHistory(space, problem)

    def suggest(self) -> dict:  # pragma: no cover - interface
        raise NotImplementedError

    def observe(self, config: dict, result: ExecResult) -> None:
        self.history.add(config, result)

    def best_config(self) -> dict:
        best = self.history.best()
        return best.config if best else self.space.default_config()
