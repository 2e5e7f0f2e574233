"""SOTA baseline tuners the paper compares LOCAT against."""
from repro.baselines.dac import DAC
from repro.baselines.gborl import GBORL
from repro.baselines.qtune import QTune
from repro.baselines.tuneful import Tuneful

__all__ = ["Tuneful", "DAC", "GBORL", "QTune"]
