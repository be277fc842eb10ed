"""File-per-Image layout (the paper's weak baseline, e.g. ImageFolder).

One JPEG file per image plus a ``labels.csv``. Every access is a
separate small random read — the pattern that costs a seek per image in
the storage model and makes epochs "25x slower" than record layouts in
the paper's measurements.
"""
import csv
import os


def write_fpi(dir_path: str, images: list[tuple[bytes, int]]) -> list[str]:
    """Write (jpeg, label) pairs as one file per image; returns file paths."""
    os.makedirs(dir_path, exist_ok=True)
    paths = []
    with open(os.path.join(dir_path, "labels.csv"), "w", newline="") as f:
        wr = csv.writer(f)
        wr.writerow(["file", "label"])
        for i, (jpeg, label) in enumerate(images):
            name = f"img_{i:06d}.jpg"
            p = os.path.join(dir_path, name)
            with open(p, "wb") as imf:
                imf.write(jpeg)
            wr.writerow([name, label])
            paths.append(p)
    return paths


def read_fpi(dir_path: str) -> list[tuple[int, bytes]]:
    """Read a File-per-Image directory; returns [(label, jpeg_bytes)]."""
    out = []
    with open(os.path.join(dir_path, "labels.csv")) as f:
        for row in csv.DictReader(f):
            with open(os.path.join(dir_path, row["file"]), "rb") as imf:
                out.append((int(row["label"]), imf.read()))
    return out
