"""Compared tuning methods (§6.1): Random, RFHOC, DAC, CherryPick,
Tuneful, LOCAT — reimplemented at the algorithmic level — plus the
shared Tuner protocol and the capability flags behind the paper's
Table 1."""
from repro.baselines.base import Capabilities, Tuner
from repro.baselines.random_search import RandomSearchTuner
from repro.baselines.rfhoc import RFHOCTuner
from repro.baselines.dac import DACTuner
from repro.baselines.cherrypick import CherryPickTuner
from repro.baselines.tuneful import TunefulTuner
from repro.baselines.locat import LOCATTuner

__all__ = [
    "Capabilities", "Tuner", "RandomSearchTuner", "RFHOCTuner", "DACTuner",
    "CherryPickTuner", "TunefulTuner", "LOCATTuner",
]
