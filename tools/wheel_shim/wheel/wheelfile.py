"""WheelFile: a ZipFile that maintains the PEP 427 RECORD manifest."""
from __future__ import annotations

import base64
import hashlib
import os
import re
import stat
import time
from zipfile import ZIP_DEFLATED, ZipFile, ZipInfo

_WHEEL_NAME_RE = re.compile(
    r"^(?P<namever>(?P<name>[^\s-]+?)-(?P<ver>[^\s-]+?))"
    r"(-(?P<build>\d[^\s-]*))?-(?P<pyver>[^\s-]+?)"
    r"-(?P<abi>[^\s-]+?)-(?P<plat>[^\s-]+?)\.whl$"
)


def _urlsafe_b64_nopad(digest: bytes) -> str:
    return base64.urlsafe_b64encode(digest).rstrip(b"=").decode("ascii")


class WheelFile(ZipFile):
    """Write-mode wheel archive that appends a valid RECORD on close."""

    def __init__(self, file, mode: str = "r", compression=ZIP_DEFLATED):
        super().__init__(file, mode, compression=compression, allowZip64=True)
        basename = os.path.basename(str(file))
        match = _WHEEL_NAME_RE.match(basename)
        if match is None:
            raise ValueError(f"bad wheel filename: {basename!r}")
        self.parsed_filename = match
        self.dist_info_path = f"{match.group('namever')}.dist-info"
        self.record_path = f"{self.dist_info_path}/RECORD"
        self._records: list[tuple[str, str, str]] = []

    # -- recording writes -------------------------------------------------
    def writestr(self, zinfo_or_arcname, data, *args, **kwargs):
        if isinstance(data, str):
            data = data.encode("utf-8")
        arcname = (
            zinfo_or_arcname.filename
            if isinstance(zinfo_or_arcname, ZipInfo)
            else zinfo_or_arcname
        )
        if arcname != self.record_path:
            digest = hashlib.sha256(data).digest()
            self._records.append(
                (arcname, f"sha256={_urlsafe_b64_nopad(digest)}", str(len(data)))
            )
        super().writestr(zinfo_or_arcname, data, *args, **kwargs)

    def write(self, filename, arcname=None, *args, **kwargs):
        with open(filename, "rb") as f:
            data = f.read()
        arcname = arcname if arcname is not None else os.path.basename(filename)
        zinfo = ZipInfo(arcname, date_time=time.localtime(time.time())[:6])
        zinfo.external_attr = (stat.S_IMODE(os.stat(filename).st_mode) | stat.S_IFREG) << 16
        zinfo.compress_type = self.compression
        self.writestr(zinfo, data)

    def write_files(self, base_dir: str) -> None:
        """Archive every file under ``base_dir`` (RECORD written on close)."""
        for root, dirs, files in os.walk(base_dir):
            dirs.sort()
            for name in sorted(files):
                path = os.path.join(root, name)
                arcname = os.path.relpath(path, base_dir).replace(os.sep, "/")
                if arcname != self.record_path:
                    self.write(path, arcname)

    def close(self) -> None:
        if self.mode == "w" and self.fp is not None:
            lines = [",".join(rec) for rec in self._records]
            lines.append(f"{self.record_path},,")
            super().writestr(self.record_path, "\n".join(lines) + "\n")
        super().close()
