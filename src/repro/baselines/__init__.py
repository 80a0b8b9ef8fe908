"""Stand-alone state-of-the-art systems BLEND is compared against
(§VIII): Josie [69], MATE [24], QCR sketches [49], Starmie [25] — each
with its own index — plus storage measurement for Table VIII."""
from .josie import Josie, JosieResult
from .mate import Mate, MateResult
from .qcr import QcrResult, QcrSketch
from .starmie import Starmie, StarmieResult
from .storage import storage_report
from .store import CsvStore

__all__ = [
    "Josie",
    "JosieResult",
    "Mate",
    "MateResult",
    "QcrSketch",
    "QcrResult",
    "Starmie",
    "StarmieResult",
    "storage_report",
    "CsvStore",
]
