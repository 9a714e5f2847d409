"""Benchmark regenerating the §7.2 scaling study (Figures 11/12 as
numbers): simulated interaction counts and verification costs at
10(2) / 100(4) / 300(6)."""
from repro.bench.scaling import growth_ratios, run_study


def test_scaling_study(benchmark):
    points = benchmark.pedantic(run_study, rounds=1, iterations=1)
    print()
    for p in points:
        print(
            f"{p.label}: clx_inter={p.clx_interactions} "
            f"ff_inter={p.ff_interactions} "
            f"clx_verif={p.clx_verification_cost} "
            f"ff_verif={p.ff_verification_cost}"
        )
    g = growth_ratios(points)
    print(f"growth 10(2)->300(6): CLX x{g['clx_growth']} FF x{g['ff_growth']}")
    assert g["ff_growth"] > g["clx_growth"]
