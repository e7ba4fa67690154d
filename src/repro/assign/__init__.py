"""Task assignment algorithms (paper §4 and compared baselines)."""
from repro.assign.common import AssignContext
from repro.assign.eai import eai_assign
from repro.assign.qasca import qasca_assign
from repro.assign.mb import mb_assign
from repro.assign.me import me_assign

__all__ = ["AssignContext", "eai_assign", "qasca_assign", "mb_assign", "me_assign"]
