"""The paper's contribution: the fairness audit framework for EM."""
from repro.core.audit import audit, run_algorithm1  # noqa: F401
from repro.core.measures import ALL_MEASURES, MEASURES, rate  # noqa: F401
