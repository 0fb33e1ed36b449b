"""Baselines from Aslay et al. [5]: CA/CS-Greedy and TI-CARM/TI-CSRM."""
from repro.baselines.cs_greedy import ca_greedy, cs_greedy
from repro.baselines.tim import kpt_estimation, tim_theta
from repro.baselines.ti_carm import ti_rm, TIResult

__all__ = [
    "ca_greedy",
    "cs_greedy",
    "kpt_estimation",
    "tim_theta",
    "ti_rm",
    "TIResult",
]
