"""Stream substrate: timestamped micro-batch streams over Spark.

The paper consumes Kafka streams into Storm topologies; here a stream is
a Spark DataFrame with a ``__tau`` arrival-timestamp column, sliced into
time-ordered micro-batches (the engine's epochs)."""
from .microbatch import StreamSet, timestamped

__all__ = ["StreamSet", "timestamped"]
