"""Storage cost model: seek latency + bandwidth-proportional transfer.

This is exactly the model the paper's appendix assumes ("read latencies
are proportional to the number of bytes read — reading at bandwidth W
is achieved after an input-size-independent setup cost", Lemma A.1).
Record layouts pay one seek per record; File-per-Image pays one seek
per image, which is where the paper's 25x epoch blowup comes from.

Default constants approximate the paper's testbed: 7200RPM HDD
(~8 ms seek) delivering ~200 MiB/s sequential per OSD stream.
"""
from dataclasses import dataclass

MiB = 1 << 20


@dataclass(frozen=True)
class StorageModel:
    bandwidth: float = 200 * MiB  # bytes/second sustained sequential
    seek_latency: float = 0.008  # seconds per random access

    def read_time(self, nbytes: int, n_seeks: int = 1) -> float:
        """Seconds to service ``nbytes`` split over ``n_seeks`` random reads."""
        return n_seeks * self.seek_latency + nbytes / self.bandwidth

    def record_epoch_time(self, n_images: int, mean_image_bytes: float,
                         images_per_record: int) -> float:
        """Epoch read time for a record layout (one seek per record)."""
        n_records = -(-n_images // images_per_record)
        return self.read_time(int(n_images * mean_image_bytes), n_records)

    def fpi_epoch_time(self, n_images: int, mean_image_bytes: float) -> float:
        """Epoch read time for File-per-Image (one seek per image)."""
        return self.read_time(int(n_images * mean_image_bytes), n_images)
