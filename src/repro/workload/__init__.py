"""Evaluation workloads: the Fig. 4 operations O1–O11 and the Fig. 10
case-study questions Q1–Q20, both driven through the engine via the
:class:`repro.workload.sheet.Spreadsheet` facade."""
from repro.workload.sheet import Spreadsheet

__all__ = ["Spreadsheet"]
