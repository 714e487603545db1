"""Fig. 11 companion (figures are out of scope; this prints the numbers):
machine roof, per-method arithmetic intensity, and bound classification."""
from __future__ import annotations

import pandas as pd
from _common import get_spark, show

from repro.codecs.base import TABLE4_METHODS
from repro.roofline.model import measure_machine_roof, profile_codecs


def run(spark=None):
    roof = measure_machine_roof()
    pts = profile_codecs(TABLE4_METHODS, roof, scale=0.5)
    pdf = pd.DataFrame(
        [
            {
                "method": p.method,
                "ai_ops_per_byte": p.ai,
                "achieved_gops": p.achieved_gops,
                "roof_gops": p.roof_gops,
                "bound": p.bound,
                "utilization": p.utilization,
            }
            for p in pts
        ]
    )
    return roof, pdf


if __name__ == "__main__":
    roof, pdf = run()
    print(f"machine roof: mem={roof.mem_bw_gbs:.1f} GB/s, compute={roof.compute_gops:.1f} GOPS, "
          f"ridge AI={roof.ridge_ai:.2f} ops/byte")
    show("Roofline placement (msg-bt analog)", pdf)
