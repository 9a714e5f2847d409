"""Reproduce the §7.2 verification-effort scaling study (Figures 11–12
as numbers): the 10(2) / 100(4) / 300(6) phone-normalization cases.

Driver-only (simulated users over in-memory lists).
"""
from repro.bench.scaling import growth_ratios, run_study

if __name__ == "__main__":
    pts = run_study()
    print("== Verification-effort scaling (Fig. 11/12 analog) ==")
    hdr = (f"{'case':8s} {'n':>4s} {'pats':>4s} {'clx_inter':>9s} "
           f"{'ff_inter':>8s} {'clx_verif':>9s} {'ff_verif':>8s}")
    print(hdr)
    for p in pts:
        print(f"{p.label:8s} {p.n:4d} {p.n_patterns:4d} "
              f"{p.clx_interactions:9d} {p.ff_interactions:8d} "
              f"{p.clx_verification_cost:9d} {p.ff_verification_cost:8d}")
    g = growth_ratios(pts)
    print(f"\nverification-cost growth 10(2) -> 300(6): "
          f"CLX x{g['clx_growth']}  FlashFill x{g['ff_growth']}")
    print("(paper, wall-clock human study: CLX x1.3, FlashFill x11.4)")
