"""Table 4 + Fig. 7: compression ratios per dataset × method, domain and
overall harmonic means, and the Friedman/Nemenyi ranking summary."""
from __future__ import annotations

from _common import get_spark, repeats, scale, show

from repro.core.tables import full_sweep, metrics_pdf, ranking_summary, table4


def run(spark):
    res = full_sweep(spark, scale=scale(), repeats=repeats())
    m = metrics_pdf(res)
    t4 = table4(m)
    rs = ranking_summary(m)
    return t4, rs, res


if __name__ == "__main__":
    spark = get_spark("table04")
    t4, rs, res = run(spark)
    show("Table 4: compression ratios", t4)
    print(f"\nFriedman chi2={rs.friedman.statistic:.2f} p={rs.friedman.p_value:.2e} "
          f"(k={rs.friedman.k}, N={rs.friedman.n}); Nemenyi CD={rs.cd:.3f}")
    print("ranking (best first):", " > ".join(rs.order))
    print("top clique (no significant difference):", rs.groups[0] if rs.groups else "-")
    from repro.core.harness import failures
    f = failures(res).toPandas()
    if len(f):
        print("\nfailed cells (paper's '-'):")
        print(f.to_string(index=False))
    spark.stop()
