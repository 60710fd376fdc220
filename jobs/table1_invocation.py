"""Table 1 + Fig 5: function-invocation characteristics and two-level tree.

Usage: python jobs/table1_invocation.py  (no Spark needed — pure DES)
"""
from _common import print_table

from repro.faas import invocation as inv


def main() -> None:
    rows = [
        {
            "region": r["region"],
            "single_invocation_ms": r["single_invocation_ms"],
            "concurrent_rate_inv_s": r["concurrent_rate_per_s"],
            "intra_region_rate_inv_s": r["intra_region_rate_per_s"],
        }
        for r in inv.table1()
    ]
    print_table(rows, "Table 1: characteristics of function invocations (simulated)")
    print("paper: single inv 36/363/474/536 ms; concurrent 294/276/243/222; intra 81/79/84/81")

    tree = inv.simulate_two_level(4096, inv.REGIONS["us"], cold=True)
    naive = inv.simulate_driver_invocations(4096, inv.REGIONS["us"])
    print_table(
        [
            {
                "strategy": "two-level tree (cold)",
                "last_invocation_initiated_s": tree.last_initiated,
                "all_running_s": tree.all_running,
            },
            {
                "strategy": "driver-only",
                "last_invocation_initiated_s": naive.last_initiated,
                "all_running_s": naive.all_running,
            },
        ],
        "Fig 5: starting 4096 workers",
    )
    print("paper: tree initiates last worker after ~2.5 s; driver-only would take 13-18 s")


if __name__ == "__main__":
    main()
