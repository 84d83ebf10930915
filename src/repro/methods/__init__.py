"""Progressive ER methods.

Every method is a pure function

    method(profiles, er_type, *, n_max, **params) -> DataFrame(emission_idx, i, j)

materialising the static comparison order the paper's
initialization/emission API iterates over (DESIGN.md §1). ``n_max`` caps
the stream at the experiment's emission budget; ``n_max=None`` yields the
complete order (used by the Same-Eventual-Quality tests).

``METHODS`` maps paper acronyms to callables; PSN additionally needs the
dataset's schema-based ``key_fn`` and is therefore registered separately
in ``SCHEMA_BASED_METHODS``.
"""
from repro.methods.psn import psn
from repro.methods.sa_psn import sa_psn
from repro.methods.sa_psab import sa_psab
from repro.methods.ls_psn import ls_psn
from repro.methods.gs_psn import gs_psn
from repro.methods.pbs import pbs
from repro.methods.pps import pps

METHODS = {
    "SA-PSN": sa_psn,
    "SA-PSAB": sa_psab,
    "LS-PSN": ls_psn,
    "GS-PSN": gs_psn,
    "PBS": pbs,
    "PPS": pps,
}

SCHEMA_BASED_METHODS = {"PSN": psn}

__all__ = [
    "METHODS",
    "SCHEMA_BASED_METHODS",
    "psn",
    "sa_psn",
    "sa_psab",
    "ls_psn",
    "gs_psn",
    "pbs",
    "pps",
]
