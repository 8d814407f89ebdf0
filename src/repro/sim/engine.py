"""Cost-model simulation of an MV refresh run (DESIGN.md §4.4).

Replays a plan over *measured* per-node metadata (`warehouse.metadata`)
with the same additive accounting the paper's Table IV metric obeys
(there, Query = Table read + Compute exactly):

* **table read** — for every node, the scan cost of its base tables
  plus, per parent, the Parquet re-scan cost if the parent is on disk
  or the memory-scan cost if it is resident in the Memory Catalog
  (flagged parents are always resident when children run — release
  happens only after the last child);
* **compute** — the node's measured compute time (inputs cached);
* **write** — synchronous for unflagged nodes; for flagged nodes the
  write is asynchronous: it occupies the disk channel in the background
  and only extends the end-to-end time if it outlives downstream work
  (paper §III-C "parallelizing compute and materialization").

End-to-end time is the sequential read+compute+sync-write timeline,
extended by any background-write tail.
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.core.graph import Plan
from repro.warehouse.metadata import WorkloadProfile
from repro.workloads.spec import WorkloadSpec


@dataclass
class SimTotals:
    read_s: float  # total table-read time (base + intermediate)
    compute_s: float
    write_s: float  # synchronous write time on the critical path
    async_tail_s: float  # background-write time past the last node
    peak_mem_bytes: float

    @property
    def query_s(self) -> float:
        """The paper's Table IV "Query" metric: read + compute."""
        return self.read_s + self.compute_s

    @property
    def end_to_end_s(self) -> float:
        return self.read_s + self.compute_s + self.write_s + self.async_tail_s


def simulate_run(
    wl: WorkloadSpec,
    profile: WorkloadProfile,
    plan: Plan,
    *,
    speed_factor: float = 1.0,
) -> SimTotals:
    """Account one refresh run of ``wl`` under ``plan``.

    ``speed_factor`` uniformly scales every time component (used by the
    cluster model); 1.0 replays the profiled single-worker times.
    """
    names = wl.node_names
    flagged = {names[i] for i in plan.flagged}
    # Residency bookkeeping for peak-memory reporting.
    pending_children = dict(profile.n_children)
    resident: dict[str, float] = {}
    peak = 0.0

    read_s = compute_s = sync_write_s = 0.0
    timeline = 0.0  # sequential read+compute+sync-write clock
    disk_free_at = 0.0  # when the background-write channel frees up

    for i in plan.order:
        nd = wl.nodes[i]
        st = profile.stats[nd.name]
        base = sum(
            profile.base_scan_s[t]
            for t in wl.referenced_tables(nd)
            if t in profile.base_scan_s
        )
        inter = sum(
            profile.stats[p].mem_read_s
            if p in resident
            else profile.stats[p].read_s
            for p in nd.parents
        )
        node_read = (base + inter) * speed_factor
        node_compute = st.compute_s * speed_factor
        read_s += node_read
        compute_s += node_compute
        timeline += node_read + node_compute
        if nd.name in flagged:
            resident[nd.name] = st.out_bytes
            peak = max(peak, sum(resident.values()))
            # flagged: pay the write-from-cache encode on the critical
            # path; the storage transfer claims the (single) background
            # channel from max(now, channel free).
            w = st.flag_write_s * speed_factor
            sync_write_s += w
            timeline += w
            disk_free_at = (
                max(disk_free_at, timeline)
                + st.async_write_s * speed_factor
            )
        else:
            # unflagged: create-on-disk + transfer, fully synchronous.
            # write_s is signed: create_disk + transfer − create_mem.
            w = st.write_s * speed_factor
            sync_write_s += w
            timeline += w
            disk_free_at = max(disk_free_at, timeline)
        for p in nd.parents:
            pending_children[p] -= 1
            if pending_children[p] == 0:
                resident.pop(p, None)

    tail = max(0.0, disk_free_at - timeline)
    return SimTotals(
        read_s=read_s,
        compute_s=compute_s,
        write_s=sync_write_s,
        async_tail_s=tail,
        peak_mem_bytes=peak,
    )
