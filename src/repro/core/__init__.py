"""The paper's core: length bounds, AMC (Alg. 1), SMM (Alg. 2), GEER (Alg. 3)."""
from repro.core.amc import AMCResult, amc, amc_er
from repro.core.geer import GEERResult, geer
from repro.core.lengths import ell_ours, ell_peng
from repro.core.smm import SMMResult, smm_er, smm_local, spmv_spark

__all__ = [
    "AMCResult",
    "amc",
    "amc_er",
    "GEERResult",
    "geer",
    "ell_ours",
    "ell_peng",
    "SMMResult",
    "smm_er",
    "smm_local",
    "spmv_spark",
]
