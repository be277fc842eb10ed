"""Token-bucket bandwidth limiter.

The paper implements exactly this in its tf.data reader to produce the
Figure 16 bandwidth sweep: "Each second, a node accumulates a fixed
amount of tokens, which are traded for bytes read off storage, and thus
nodes will block if they use too much bandwidth in a given time."
"""
from dataclasses import dataclass, field


@dataclass
class TokenBucket:
    rate: float  # tokens (bytes) added per second
    burst: float  # bucket capacity in tokens (bytes)
    tokens: float = field(default=None)
    clock: float = 0.0

    def __post_init__(self):
        if self.tokens is None:
            self.tokens = self.burst

    def consume(self, nbytes: float, now: float | None = None) -> float:
        """Consume ``nbytes`` tokens; returns the time the read completes.

        If ``now`` is given the bucket first refills up to ``now``;
        otherwise the internal clock advances only by blocking.
        """
        if now is not None and now > self.clock:
            self.tokens = min(self.burst, self.tokens + (now - self.clock) * self.rate)
            self.clock = now
        if nbytes <= self.tokens:
            self.tokens -= nbytes
            return self.clock
        deficit = nbytes - self.tokens
        wait = deficit / self.rate
        self.tokens = 0.0
        self.clock += wait
        return self.clock
