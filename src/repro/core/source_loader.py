"""Source Loader — the per-source ingestion actor (§3).

Each Source Loader is dedicated to one data source (optionally one
*shard* of a source under Source Parallelism) and owns that source's
file access state: a positional cursor over the source's Parquet
dataset, a bounded read buffer of sample metadata, and the source's
transformation pipeline. Dedicating loaders to sources is what removes
the per-(worker, source) file-state replication of colocated loaders.

The data path is Spark: ``fill()`` reads the next cursor range from the
source's Parquet file via a predicate-pushdown range scan. When the
loader was built without an on-disk source (pure-synthetic runs and
replay after failure), rows are regenerated bit-identically from the
counter-based generator instead — both paths produce the same rows, a
property the tests assert.

Worker parallelism is modelled explicitly: ``workers`` amortises the
per-sample transformation latency (Worker Parallel in Fig. 10), and the
loader accounts its own memory as base worker contexts + file state +
buffered bytes, the (P, T, M) cost tuple of §5.1.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.data.sources import SourceSpec, generate_source_rows

#: resident memory of one worker process context (interpreter + transform
#: libraries + prefetch slot), GB — Fig. 4's "worker scaling" dimension
WORKER_BASE_GB = 0.35
#: bytes of buffered sample metadata+payload accounted per buffered sample
#: are taken from the sample's own ``sample_bytes`` column


@dataclass
class LoaderState:
    """Checkpointable state: cursor + staged/prepared progress. The read
    buffer itself is *not* checkpointed (it is large); recovery re-reads
    from ``cursor_ckpt`` — the replay path of §6.1."""

    cursor: int = 0
    prepared_upto: int = 0
    steps_served: int = 0


class SourceLoader:
    """One source-loader actor.

    Parameters
    ----------
    spec : the source description (cost/memory characteristics).
    path : Parquet dataset path; ``None`` → generate rows directly.
    shard, n_shards : Source-Parallel shard of the source this actor
        serves (rows with ``row_idx % n_shards == shard``).
    workers : worker-parallel degree inside this actor.
    buffer_capacity : max buffered samples (read buffer).
    """

    def __init__(
        self,
        spec: SourceSpec,
        *,
        spark: SparkSession | None = None,
        path: str | None = None,
        shard: int = 0,
        n_shards: int = 1,
        workers: int = 1,
        buffer_capacity: int = 4096,
        seed: int = 0,
    ):
        if not (0 <= shard < n_shards):
            raise ValueError("shard must lie in [0, n_shards)")
        if workers <= 0 or buffer_capacity <= 0:
            raise ValueError("workers and buffer_capacity must be positive")
        if path is not None and spark is None:
            raise ValueError("reading a Parquet source requires a SparkSession")
        self.spec = spec
        self.spark = spark
        self.path = path
        self.shard = shard
        self.n_shards = n_shards
        self.workers = workers
        self.buffer_capacity = buffer_capacity
        self.seed = seed
        self.state = LoaderState()
        self._buffer = pd.DataFrame()
        self._staged: list[pd.DataFrame] = []
        self.failed = False

    # -- ingestion -----------------------------------------------------------

    def _read_range(self, start: int, count: int) -> pd.DataFrame:
        """Rows [start, start+count) of *this shard's* row stream."""
        # shard-local position i maps to global row_idx = i * n_shards + shard
        lo = start * self.n_shards + self.shard
        hi = (start + count) * self.n_shards + self.shard
        if self.path is not None:
            pdf = (
                self.spark.read.parquet(self.path)
                .filter(
                    (F.col("row_idx") >= lo)
                    & (F.col("row_idx") < hi)
                    & (F.col("row_idx") % self.n_shards == self.shard)
                )
                .orderBy("row_idx")
                .toPandas()
            )
        else:
            pdf = generate_source_rows(self.spec, lo, hi - lo, seed=self.seed)
            pdf = pdf[pdf["row_idx"] % self.n_shards == self.shard].reset_index(
                drop=True
            )
        return pdf

    def fill(self, n: int) -> int:
        """Read up to ``n`` new samples into the buffer (bounded by
        capacity); returns the number actually read. Workflow step 6."""
        if self.failed:
            raise RuntimeError(f"loader for {self.spec.name} has failed")
        room = self.buffer_capacity - len(self._buffer)
        n = min(n, room)
        if n <= 0:
            return 0
        pdf = self._read_range(self.state.cursor, n)
        self.state.cursor += n
        self._buffer = pd.concat([self._buffer, pdf], ignore_index=True)
        return len(pdf)

    # -- planner interface ---------------------------------------------------

    def summary_buffer(self) -> pd.DataFrame:
        """Lightweight buffer metadata for the Planner: sample indices,
        source signature, token lengths. No payloads cross this path."""
        if self._buffer.empty:
            return pd.DataFrame(
                columns=["source_id", "source", "row_idx", "text_len", "image_patches"]
            )
        return self._buffer[
            ["source_id", "source", "row_idx", "text_len", "image_patches"]
        ].copy()

    def prepare(self, row_idxs: list[int]) -> float:
        """Execute a loading plan: pop the named samples from the read
        buffer, apply the sample transformation, and stage them for the
        Data Constructor. Returns the (simulated) transformation
        latency, amortised across this actor's workers."""
        if self.failed:
            raise RuntimeError(f"loader for {self.spec.name} has failed")
        wanted = set(int(i) for i in row_idxs)
        have = self._buffer["row_idx"].isin(wanted) if not self._buffer.empty else None
        if have is None or int(have.sum()) != len(wanted):
            got = set() if have is None else set(self._buffer.loc[have, "row_idx"])
            raise KeyError(
                f"{self.spec.name}: plan requests rows not in buffer: "
                f"{sorted(wanted - got)[:5]}..."
            )
        picked = self._buffer[have].sort_values("row_idx").reset_index(drop=True)
        self._buffer = self._buffer[~have].reset_index(drop=True)
        self._staged.append(picked)
        self.state.prepared_upto = max(
            self.state.prepared_upto, int(picked["row_idx"].max()) + 1
        )
        self.state.steps_served += 1
        return self.transform_latency(len(picked))

    def pop_staged(self) -> pd.DataFrame:
        """Constructor-side fetch of everything staged so far."""
        if not self._staged:
            return pd.DataFrame(columns=self._buffer.columns)
        out = pd.concat(self._staged, ignore_index=True)
        self._staged = []
        return out

    # -- cost accounting -----------------------------------------------------

    def transform_latency(self, n_samples: int) -> float:
        """Seconds to transform ``n_samples``: per-sample cost amortised
        over worker-parallel workers (Fig. 10 Worker Parallel)."""
        return n_samples * self.spec.transform_cost_s / self.workers

    def memory_gb(self) -> float:
        """Resident memory: worker contexts + this shard's file access
        state + buffered sample bytes.

        Unlike a colocated PyTorch loader — whose ``num_workers``
        *reader* processes each open every source — an OVERLORD Source
        Loader actor holds its (sharded) file access state exactly once;
        its workers only transform staged samples (§5.1 Worker Parallel
        staggers transformation, not reading). A shard holds ~1/n of the
        source's row-group/footer state plus a fixed connection floor.
        """
        file_state = self.spec.file_state_gb / self.n_shards + 0.005
        buffered = (
            float(self._buffer["sample_bytes"].sum()) / 1e9
            if not self._buffer.empty
            else 0.0
        )
        return self.workers * WORKER_BASE_GB + file_state + buffered

    # -- fault tolerance -----------------------------------------------------

    def checkpoint(self) -> dict:
        return {
            "source": self.spec.name,
            "shard": self.shard,
            "cursor": self.state.cursor,
            "prepared_upto": self.state.prepared_upto,
            "steps_served": self.state.steps_served,
        }

    def restore(self, ckpt: dict) -> None:
        if ckpt["source"] != self.spec.name or ckpt["shard"] != self.shard:
            raise ValueError("checkpoint does not belong to this loader shard")
        self.state = LoaderState(
            cursor=ckpt["cursor"],
            prepared_upto=ckpt["prepared_upto"],
            steps_served=ckpt["steps_served"],
        )
        self._buffer = pd.DataFrame()
        self._staged = []
        self.failed = False

    def fail(self) -> None:
        """Inject a failure (for fault-tolerance experiments)."""
        self.failed = True
        self._buffer = pd.DataFrame()
        self._staged = []
