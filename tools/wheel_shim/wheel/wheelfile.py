"""PEP 427 wheel archive writer (minimal).

Provides the ``WheelFile`` API setuptools' ``editable_wheel`` command
uses: a ZipFile that records sha256 digests of everything written and
emits the ``RECORD`` manifest on close.
"""
from __future__ import annotations

import base64
import hashlib
import os
import re
import stat
import zipfile

__all__ = ["WheelFile"]

_NAME_RE = re.compile(
    r"^(?P<name>[^-]+)-(?P<version>[^-]+?)(-(?P<build>\d[^-]*))?"
    r"-(?P<tags>.+?)\.whl$"
)


def _b64(digest: bytes) -> str:
    return base64.urlsafe_b64encode(digest).rstrip(b"=").decode("ascii")


class WheelFile(zipfile.ZipFile):
    """Write-mode wheel archive with automatic RECORD generation."""

    def __init__(self, file, mode="r", compression=zipfile.ZIP_DEFLATED):
        super().__init__(file, mode, compression=compression, allowZip64=True)
        m = _NAME_RE.match(os.path.basename(str(file)))
        if m:
            self.dist_info_path = f"{m.group('name')}-{m.group('version')}.dist-info"
        else:  # fall back: located lazily from written entries
            self.dist_info_path = None
        self._records: list[tuple[str, str, int]] = []

    # -- recording writes -------------------------------------------------
    def writestr(self, zinfo_or_arcname, data, *args, **kwargs):
        if isinstance(data, str):
            data = data.encode("utf-8")
        super().writestr(zinfo_or_arcname, data, *args, **kwargs)
        arcname = (
            zinfo_or_arcname.filename
            if isinstance(zinfo_or_arcname, zipfile.ZipInfo)
            else zinfo_or_arcname
        )
        self._record(arcname, data)

    def write(self, filename, arcname=None, compress_type=None, compresslevel=None):
        arcname = arcname or filename
        super().write(filename, arcname, compress_type)
        with open(filename, "rb") as f:
            self._record(arcname, f.read())

    def write_files(self, base_dir):
        """Add every regular file under ``base_dir`` (deterministic order)."""
        for root, dirs, files in os.walk(base_dir):
            dirs.sort()
            for name in sorted(files):
                path = os.path.join(root, name)
                if not stat.S_ISREG(os.stat(path).st_mode):
                    continue
                arcname = os.path.relpath(path, base_dir).replace(os.sep, "/")
                if arcname.endswith(".dist-info/RECORD"):
                    continue  # regenerated on close
                self.write(path, arcname)

    def _record(self, arcname: str, data: bytes) -> None:
        if arcname.endswith(".dist-info/RECORD"):
            return
        if self.dist_info_path is None and ".dist-info/" in arcname:
            self.dist_info_path = arcname.split(".dist-info/")[0] + ".dist-info"
        digest = hashlib.sha256(data).digest()
        self._records.append((arcname, f"sha256={_b64(digest)}", len(data)))

    # -- finalisation ------------------------------------------------------
    def close(self):
        if self.fp is not None and self.mode == "w" and self._records:
            di = self.dist_info_path or "UNKNOWN-0.dist-info"
            record = di + "/RECORD"
            lines = [f"{n},{h},{s}" for n, h, s in self._records]
            lines.append(f"{record},,")
            super().writestr(record, ("\n".join(lines) + "\n").encode("utf-8"))
            self._records = []
        super().close()
