"""Figure 10 benchmarks: update workloads and complete workloads on the
real-dataset substitutes."""
import numpy as np
import pytest

from repro.experiments.fig10_updates import complete_workload, updates_workload


class TestFig10aUpdates:
    @pytest.mark.parametrize("batch", [100, 500])
    def test_updates_batchsize(self, benchmark, spark, tmp_path, batch):
        rows = benchmark.pedantic(
            lambda: updates_workload(
                spark, total_series=1000, initial_frac=0.5, batch_sizes=(batch,),
                length=128, w=8, bits=8, leaf_capacity=100,
                workdir=str(tmp_path),
            ),
            rounds=1, iterations=1,
        )
        by = {r["system"]: r["sim_s"] for r in rows}
        benchmark.extra_info["ctree_sim_s"] = round(by["CTree"], 4)
        benchmark.extra_info["ads_sim_s"] = round(by["ADS+"], 4)


class TestFig10bcCompleteWorkloads:
    @pytest.mark.parametrize("kind", ["astro", "seismic"])
    def test_complete_workload(self, benchmark, spark, tmp_path, kind):
        rows = benchmark.pedantic(
            lambda: complete_workload(
                spark, kind=kind, n_series=2000, n_queries=10, length=128,
                # Paper Fig 10 restricts memory to 0.01% of the data —
                # small enough that even the summaries do not fit; 0.01
                # is the equivalent regime at this scale.
                w=8, bits=8, leaf_capacity=100, mem_fracs=(0.01,),
                workdir=str(tmp_path),
            ),
            rounds=1, iterations=1,
        )
        for r in rows:
            benchmark.extra_info[f"{r['system']}_total_sim_s"] = round(r["total_sim_s"], 4)
            benchmark.extra_info[f"{r['system']}_index_bytes"] = r["index_bytes"]
        by = {r["system"]: r for r in rows}
        assert by["CTree"]["total_sim_s"] < by["ADS+"]["total_sim_s"]
        assert by["CTreeFull"]["index_bytes"] < by["ADSFull"]["index_bytes"]
