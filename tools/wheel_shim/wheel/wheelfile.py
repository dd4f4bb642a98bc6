"""WheelFile: a ZipFile that maintains the PEP-427 RECORD on close."""
from __future__ import annotations

import base64
import hashlib
import os
import re
import zipfile


def _urlsafe_b64_nopad(digest: bytes) -> str:
    return base64.urlsafe_b64encode(digest).rstrip(b"=").decode("ascii")


class WheelFile(zipfile.ZipFile):
    """Write-mode zip archive that appends a RECORD entry on close."""

    def __init__(self, file, mode: str = "r", compression=zipfile.ZIP_DEFLATED):
        super().__init__(file, mode=mode, compression=compression, allowZip64=True)
        name = os.path.basename(str(file))
        m = re.match(r"^(?P<name>[^-]+)-(?P<ver>[^-]+)", name)
        if m is None:
            raise ValueError(f"bad wheel filename: {name}")
        self.dist_info_path = f"{m.group('name')}-{m.group('ver')}.dist-info"
        self.record_path = f"{self.dist_info_path}/RECORD"
        self._records: list[tuple[str, str, int]] = []

    def _note(self, arcname: str, data: bytes) -> None:
        digest = hashlib.sha256(data).digest()
        self._records.append((arcname, f"sha256={_urlsafe_b64_nopad(digest)}", len(data)))

    def write(self, filename, arcname=None, compress_type=None):  # noqa: D102
        with open(filename, "rb") as f:
            data = f.read()
        arcname = arcname if arcname is not None else filename
        arcname = str(arcname).replace(os.sep, "/")
        self._note(arcname, data)
        super().writestr(zipfile.ZipInfo(arcname, (2020, 1, 1, 0, 0, 0)), data)

    def writestr(self, zinfo_or_arcname, data, compress_type=None):  # noqa: D102
        if isinstance(data, str):
            data = data.encode("utf-8")
        arcname = (
            zinfo_or_arcname.filename
            if isinstance(zinfo_or_arcname, zipfile.ZipInfo)
            else str(zinfo_or_arcname)
        )
        self._note(arcname, data)
        super().writestr(zinfo_or_arcname, data, compress_type)

    def write_files(self, base_dir) -> None:
        """Add every file under ``base_dir`` (RECORD last, by close())."""
        for root, dirs, files in os.walk(base_dir):
            dirs.sort()
            for fn in sorted(files):
                path = os.path.join(root, fn)
                arcname = os.path.relpath(path, base_dir).replace(os.sep, "/")
                if arcname != self.record_path:
                    self.write(path, arcname)

    def close(self) -> None:  # noqa: D102
        if self.mode == "w" and self._records is not None:
            lines = [f"{p},{h},{n}" for p, h, n in self._records]
            lines.append(f"{self.record_path},,")
            records, self._records = self._records, None
            del records
            super().writestr(self.record_path, "\n".join(lines) + "\n")
        super().close()
