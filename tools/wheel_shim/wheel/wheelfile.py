"""A ZipFile that maintains a PEP 376 RECORD — enough for PEP 660."""
from __future__ import annotations

import base64
import hashlib
import os
import re
import zipfile

_NAME_RE = re.compile(
    r"^(?P<name>.+?)-(?P<version>[^-]+?)(-(?P<build>\d[^-]*))?"
    r"-(?P<pytag>[^-]+)-(?P<abi>[^-]+)-(?P<plat>[^-]+)\.whl$"
)


def _record_hash(data: bytes) -> str:
    digest = hashlib.sha256(data).digest()
    return "sha256=" + base64.urlsafe_b64encode(digest).rstrip(b"=").decode("ascii")


class WheelFile(zipfile.ZipFile):
    """Write-mode wheel archive with automatic RECORD generation."""

    def __init__(self, file, mode="r", compression=zipfile.ZIP_DEFLATED):
        super().__init__(file, mode=mode, compression=compression)
        m = _NAME_RE.match(os.path.basename(str(file)))
        if m is None:
            raise ValueError(f"not a wheel filename: {file}")
        self.parsed_filename = m
        self.dist_info_path = f"{m.group('name')}-{m.group('version')}.dist-info"
        self.record_path = f"{self.dist_info_path}/RECORD"
        self._records: list[tuple[str, str, int]] = []

    def writestr(self, zinfo_or_arcname, data, *args, **kwargs):
        if isinstance(data, str):
            data = data.encode("utf-8")
        arcname = (
            zinfo_or_arcname.filename
            if isinstance(zinfo_or_arcname, zipfile.ZipInfo)
            else zinfo_or_arcname
        )
        super().writestr(zinfo_or_arcname, data, *args, **kwargs)
        if arcname != self.record_path:
            self._records.append((arcname, _record_hash(data), len(data)))

    def write(self, filename, arcname=None, *args, **kwargs):
        with open(filename, "rb") as f:
            data = f.read()
        self.writestr(arcname or os.path.basename(filename), data)

    def write_files(self, base_dir):
        for root, dirs, files in os.walk(base_dir):
            dirs.sort()
            for name in sorted(files):
                path = os.path.join(root, name)
                arc = os.path.relpath(path, base_dir).replace(os.sep, "/")
                self.write(path, arc)

    def close(self):
        if self.mode == "w" and self._records:
            lines = [f"{p},{h},{n}" for p, h, n in self._records]
            lines.append(f"{self.record_path},,")
            data = ("\n".join(lines) + "\n").encode("utf-8")
            super().writestr(self.record_path, data)
            self._records = []
        super().close()
