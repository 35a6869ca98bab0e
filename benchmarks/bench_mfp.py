"""Section 4 claim: the LSH + MFP-tree compresses the EP-Index.

No numbered table in the paper; recorded because compression is a
stated contribution.  The measure is raw EP-Index elements vs merged
MFP-tree nodes (ratio > 1 means smaller).
"""
import time

from repro.core.mfp_tree import build_compressed_ep, compression_ratio


def test_mfp_compression_on_real_ep_index(benchmark, get_dtlp, record):
    rows = []

    def run():
        rows.clear()
        dtlp = get_dtlp("NY", z=50, xi=8)
        ep_sets = {
            e: [tuple(bp.path) for bp in paths]
            for e, paths in dtlp.ep.items().items()
        }
        t0 = time.perf_counter()
        tree = build_compressed_ep(ep_sets, h=16, bands=8, seed=0)
        dt = time.perf_counter() - t0
        raw = sum(len(ps) + 1 for ps in ep_sets.values())
        ratio = compression_ratio(ep_sets, tree)
        # lossless check on a sample
        for e in list(ep_sets)[:200]:
            assert sorted(tree.paths_covering(e)) == sorted(ep_sets[e])
        rows.append(
            (len(ep_sets), raw, tree.n_nodes, f"{ratio:.2f}x", f"{dt:.1f}")
        )
        return rows

    benchmark.pedantic(run, rounds=1, iterations=1)
    record(
        "mfp_compression.md",
        ["#edges indexed (NY)", "raw_elements", "tree_nodes", "ratio", "build_s"],
        rows,
    )
