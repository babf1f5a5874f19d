"""The paper's 8 competitors (Table 2) plus ClaSS behind one interface.

Importing this package fills :data:`repro.baselines.base.DETECTOR_REGISTRY`
so Spark workers can rebuild any detector from a ``(name, params)`` pair.
"""
from __future__ import annotations

from repro.baselines.adwin import ADWIN
from repro.baselines.base import (DETECTOR_REGISTRY, ErrorStream,
                                  StreamingDetector, make_detector)
from repro.baselines.bocd import BOCD
from repro.baselines.changefinder import ChangeFinder
from repro.baselines.ddm import DDM
from repro.baselines.floss import FLOSS
from repro.baselines.hddm import HDDM
from repro.baselines.newma import NEWMA
from repro.baselines.window import WindowSegmenter
from repro.core.class_stream import ClaSS, ClaSSConfig


class ClaSSDetector(StreamingDetector):
    """ClaSS behind the common detector interface; keyword args map to
    :class:`~repro.core.class_stream.ClaSSConfig` fields."""

    def __init__(self, **cfg) -> None:
        super().__init__()
        self._cls = ClaSS(ClaSSConfig(**cfg))

    @property
    def width(self) -> int | None:
        return self._cls.width

    def _step(self, x: float) -> int | None:
        return self._cls.update(x)


DETECTOR_REGISTRY.update({
    "class": ClaSSDetector,
    "floss": FLOSS,
    "window": WindowSegmenter,
    "changefinder": ChangeFinder,
    "newma": NEWMA,
    "bocd": BOCD,
    "ddm": DDM,
    "hddm": HDDM,
    "adwin": ADWIN,
})

__all__ = [
    "ADWIN", "BOCD", "ChangeFinder", "ClaSSDetector", "DDM",
    "DETECTOR_REGISTRY", "ErrorStream", "FLOSS", "HDDM", "NEWMA",
    "StreamingDetector", "WindowSegmenter", "make_detector",
]
